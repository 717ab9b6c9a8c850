"""Shared engine plumbing: result type, bitvector gating, checkpoints.

The engine's probe counters implement the same abstract semantics as
``repro.core.simulator`` (one hash probe per alive input tuple per
operator; one BV probe per row per bitvector check; one semi-join probe
per row per phase-1 existence check), so on identical inputs and exact
bitvectors the two produce identical counts — a property the tests rely
on.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark.sql import DataFrame

from repro.bloom import build_bitvector
from repro.core.costmodel import CostBreakdown, Weights
from repro.core.datagen import id_col
from repro.core.jointree import JoinTree


@dataclass
class EngineResult:
    """Outcome of one Spark execution of (strategy, order)."""

    strategy: str
    order: list[str]
    counts: CostBreakdown = field(default_factory=CostBreakdown)
    out_rows: int | None = None
    factorized_rows: int | None = None
    wall_time_s: float = 0.0
    result: DataFrame | None = None

    def total(self, w: Weights = Weights()) -> float:
        return self.counts.total(w)


def ckpt(df: DataFrame) -> DataFrame:
    """Materialize a DataFrame and truncate its lineage.

    ``localCheckpoint(eager=True)`` plays the role of the paper engine's
    materialized intermediate vectors: iterative COM/SJ state is pinned so
    downstream semi-joins don't recompute (or replan) the whole history.
    """
    return df.localCheckpoint(eager=True)


def keycols(tree: JoinTree, a: str) -> list[str]:
    """Composite spine key of node ``a``: the id columns along root→a."""
    return [id_col(b) for b in tree.path_from_root(a)]


class Gater:
    """Bitvector bank for BVP: one filter per non-root node, built from
    the unfiltered base child relation (one-step lookahead, §3.5)."""

    def __init__(
        self,
        tree: JoinTree,
        data: dict[str, DataFrame],
        mode: str = "exact",
        **bv_kw,
    ):
        self.tree = tree
        self.bvs = {
            c: build_bitvector(data[c], tree.join_cols[c][1], mode, **bv_kw)
            for c in tree.nonroot
        }

    def gate_children(
        self,
        df: DataFrame,
        a: str,
        order_pos: dict[str, int],
        counts: CostBreakdown,
        measure: bool,
    ) -> DataFrame:
        """Apply the bitvectors of ``a``'s children to ``df`` in join-order
        sequence; in measure mode count one BV probe per row per check."""
        for c in sorted(self.tree.children(a), key=lambda c: order_pos[c]):
            if measure:
                counts.bv_probes[c] = counts.bv_probes.get(c, 0.0) + df.count()
            attr = self.tree.join_cols[c][0]
            df = self.bvs[c].filter(df, attr)
            if measure:
                df = ckpt(df)
        return df
