"""The paper's contribution: RTC computation and the RTCSharing evaluator,
plus the FullSharing [8] and NoSharing [5] baselines it is compared with."""

from repro.core.rtcsharing import RTCSharingEvaluator
from repro.core.fullsharing import FullSharingEvaluator
from repro.core.nosharing import NoSharingEvaluator
from repro.core.timing import PhaseTimings

__all__ = [
    "RTCSharingEvaluator",
    "FullSharingEvaluator",
    "NoSharingEvaluator",
    "PhaseTimings",
]
