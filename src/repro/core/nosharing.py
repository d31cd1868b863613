"""NoSharing baseline (Yakovets et al., SIGMOD 2016 [5]).

Evaluates every RPQ individually with the single-query method of [5]:
``R`` is evaluated first and its Kleene closure is computed by
iterating over the pre-evaluated ``R_G`` (rather than re-traversing G),
then joined with ``Pre_G``/``Post_G``. Nothing is shared — a multiple-
RPQ set with a common ``R+`` recomputes ``R_G`` and ``TC(G_R)`` for
every member query, which is exactly the repeated work Section II-C
describes.
"""
from __future__ import annotations

from repro.core.fullsharing import FullSharingEvaluator
from repro.core.timing import PhaseTimings
from repro.rpq.ast import Regex


class NoSharingEvaluator(FullSharingEvaluator):
    """Per-query evaluation; the closure cache is disabled."""

    name = "No"

    def _r_plus_for(self, r: Regex, timings: PhaseTimings):
        # Drop any cached closure so every query pays the full cost.
        self._plus_cache.pop(r.canon(), None)
        return super()._r_plus_for(r, timings)

    def shared_data_size(self) -> int:
        return 0
