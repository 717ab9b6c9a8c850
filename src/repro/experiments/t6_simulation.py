"""T6 (Fig 13): analytic comparison of the five approaches.

Idealized uniform setting: all relations the same size, all edges share
one (m, fo); weighted model cost (hash=1, BV/semi-join=½, tuple-gen and
expansion=1/14 — the paper's micro-benchmarked weights) per query shape,
as m sweeps 0.1…0.9 for fanouts 2 and 5. STD alone is omitted exactly as
in the paper (its costs distort the scale).
"""
from __future__ import annotations

from repro.core.costmodel import Weights, plan_costs
from repro.core.jointree import EdgeStats

from .common import md_table
from .shapes import SHAPES

APPROACHES = ("COM", "BVP+STD", "BVP+COM", "SJ+STD", "SJ+COM")
N = 100_000.0


def run(*, fanouts=(2.0, 5.0), ms=None, eps: float = 0.05):
    """``eps`` models the bloom false-positive rate (the paper's analytic
    comparison assumes bloomed bitvectors; with ε=0 an exact bitvector
    can still pay off at high m, which is not the regime studied)."""
    ms = ms or [round(0.1 * i, 1) for i in range(1, 10)]
    rows = []
    for shape in sorted(SHAPES):
        for fo in fanouts:
            for m in ms:
                t = SHAPES[shape]()
                for c in list(t.stats):
                    t.stats[c] = EdgeStats(m, fo)
                for n in t.nodes:
                    t.size[n] = N
                row = {"shape": shape, "fo": fo, "m": m}
                costs = {}
                for s in APPROACHES:
                    cb = plan_costs(t, s, None, N, eps=eps, flat_output=True)
                    costs[s] = cb.total(Weights()) / N  # cost per driver tuple
                    row[s] = costs[s]
                row["best"] = min(costs, key=costs.get)
                rows.append(row)
    return rows, md_table(rows, ["shape", "fo", "m", *APPROACHES, "best"])
