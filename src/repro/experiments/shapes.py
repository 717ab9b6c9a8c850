"""Query-shape sampling shared by T4/T6/T7/T8 (the §5.2 synthetic bench)."""
from __future__ import annotations

import random

from repro.core import jointree as jt
from repro.core.costmodel import expected_output
from repro.core.jointree import EdgeStats, JoinTree

SHAPES = {
    "star7": lambda: jt.star(6),
    "path11": lambda: jt.centered_path(11),
    "snow32": lambda: jt.snowflake(3, 2),
    "snow51": lambda: jt.snowflake(5, 1),
}


def sample_shaped_tree(
    shape: str,
    rng: random.Random,
    *,
    m_range: tuple[float, float],
    fo_range: tuple[float, float] = (1.0, 10.0),
    n_driver: int = 10_000,
    max_out: float = 2e6,
    min_out: float = 1e3,
    max_tries: int = 200,
) -> JoinTree:
    """Shape with (m, fo) ~ U(ranges), rejection-sampled so the expected
    flat output is bounded (the paper filters queries by result size)."""
    if shape not in SHAPES:
        raise ValueError(f"unknown shape {shape!r}; have {sorted(SHAPES)}")
    for _ in range(max_tries):
        t = SHAPES[shape]()
        for c in list(t.stats):
            t.stats[c] = EdgeStats(rng.uniform(*m_range), rng.uniform(*fo_range))
        out = expected_output(t, n_driver)
        if min_out <= out <= max_out:
            return t
    # Fall back: shrink fanouts toward 1 until feasible.
    t = SHAPES[shape]()
    for c in list(t.stats):
        t.stats[c] = EdgeStats(rng.uniform(*m_range), rng.uniform(1.0, 2.0))
    return t
