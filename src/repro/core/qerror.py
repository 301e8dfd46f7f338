"""Q-error (Moerkotte et al., VLDB 2009): the re-optimization trigger.

The paper re-optimizes "when the Q-error exceeds a threshold value"
(§V-A): the true cardinality is a factor n larger *or smaller* than
estimated.
"""
from __future__ import annotations


def qerror(estimate: float, truth: float) -> float:
    """max(est/true, true/est), with 0 clamped to 1 row.

    Symmetric: qerror(a, b) == qerror(b, a). Always >= 1.
    """
    est = max(float(estimate), 1.0)
    tru = max(float(truth), 1.0)
    return max(est / tru, tru / est)


def triggers(estimate: float, truth: float, threshold: float) -> bool:
    """True iff the misestimate is large enough to re-optimize."""
    if threshold < 1.0:
        raise ValueError("threshold must be >= 1")
    return qerror(estimate, truth) >= threshold
