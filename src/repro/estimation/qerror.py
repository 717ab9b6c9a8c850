"""Q-error metric [27]: max(est/true, true/est), with zero-guards."""
from __future__ import annotations


def qerror(est: float, true: float, *, floor: float = 1e-6) -> float:
    """Symmetric multiplicative error; both quantities floored so a zero
    estimate against a zero truth scores 1 (perfect), and a zero estimate
    against nonzero truth scores finitely large rather than ∞."""
    e = max(abs(est), floor)
    t = max(abs(true), floor)
    return max(e / t, t / e)
