"""STD / BVP+STD: standard left-deep pipelined execution (§4.1, §4.3).

The flat intermediate result is folded through the join order as a chain
of Catalyst inner joins; with BVP the driver scan and each join's output
are additionally gated by the children's bitvectors (§4.4).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.costmodel import CostBreakdown
from repro.core.jointree import JoinTree

from .common import Gater, ckpt


def run_std(
    tree: JoinTree,
    data: dict[str, DataFrame],
    order: list[str],
    gater: Gater | None,
    counts: CostBreakdown,
    measure: bool,
) -> DataFrame:
    """Execute the plan; returns the (lazy unless measuring) flat result."""
    order_pos = {c: i for i, c in enumerate(order)}
    df = data[tree.root]
    if gater:
        df = gater.gate_children(df, tree.root, order_pos, counts, measure)
    for l in order:
        if measure:
            counts.hash_probes[l] = float(df.count())
        pcol, ccol = tree.join_cols[l]
        df = df.join(data[l], on=F.col(pcol) == F.col(ccol), how="inner")
        if measure:
            df = ckpt(df)
            counts.tuples_generated += df.count()
        if gater and tree.children(l):
            df = gater.gate_children(df, l, order_pos, counts, measure)
    return df
