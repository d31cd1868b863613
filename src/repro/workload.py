"""Synthetic multiple-RPQ workloads (paper Section V-A).

Each multiple-RPQ set shares one common sub-query ``R`` — a
concatenation of labels of length 1–3 — and each RPQ in the set is a
batch unit ``Pre · R+ · Post`` where ``Pre`` and ``Post`` are single
labels (the paper "simulates the effects of Pre and Post using single
labels"). The paper draws 90 ``R``s (30 per length); the generator is
parameterized so jobs/benchmarks can draw a smaller sample with the
same shape (documented in EXPERIMENTS.md).

Sets are nested exactly as in the paper: "a larger multiple RPQ set
contains smaller multiple RPQ sets" — ``queries[:k]`` is the k-RPQ set.
"""
from __future__ import annotations

import random
from dataclasses import dataclass


@dataclass(frozen=True)
class RPQSet:
    """One multiple-RPQ set sharing the common sub-query ``r_text``."""

    r_text: str
    queries: tuple[str, ...]

    def subset(self, n_rpqs: int) -> tuple[str, ...]:
        if n_rpqs > len(self.queries):
            raise ValueError(
                f"set has {len(self.queries)} RPQs, asked for {n_rpqs}"
            )
        return self.queries[:n_rpqs]


def make_rpq_sets(
    labels: list[str],
    *,
    sets_per_length: int = 3,
    r_lengths: tuple[int, ...] = (1, 2, 3),
    max_rpqs_per_set: int = 10,
    seed: int = 7,
) -> list[RPQSet]:
    """Generate multiple-RPQ sets over the given label alphabet.

    Returns ``sets_per_length * len(r_lengths)`` sets, each with
    ``max_rpqs_per_set`` queries of the form ``pre.(R)+.post``.
    """
    if not labels:
        raise ValueError("need at least one label")
    rng = random.Random(seed)
    sets: list[RPQSet] = []
    for length in r_lengths:
        for _ in range(sets_per_length):
            r_labels = [rng.choice(labels) for _ in range(length)]
            r_text = ".".join(r_labels)
            queries = tuple(
                f"{rng.choice(labels)}.({r_text})+.{rng.choice(labels)}"
                for _ in range(max_rpqs_per_set)
            )
            sets.append(RPQSet(r_text=r_text, queries=queries))
    return sets
