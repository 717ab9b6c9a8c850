"""COM / BVP+COM: factorized execution avoiding redundant probes (§4.2–4.3).

The factorized intermediate representation is realized relationally:

- ``spine[n]`` — the flat expansion of the *path* driver→n only (the
  analogue of the paper's per-node VectorColumns grouped under their
  ancestors' count columns); built once, when n is joined, from the alive
  spine of its parent — this is where redundant probes are avoided, since
  side branches never multiply into the probe stream;
- ``alive[n]`` — the surviving composite keys (id columns along the path)
  of n's spine, the analogue of the selection vectors; deaths propagate
  upward when a processed branch finds no match, and downward lazily via
  probe-time semi-joins against every path ancestor's alive set;
- the final *expansion* (§4.3 "Result Expansion") joins the per-edge match
  tables back along the tree to emit flat output tuples.

Every operation below is a Catalyst plan (joins, left-semi joins,
distinct); ``localCheckpoint`` pins the factorized state exactly where
the paper's engine materializes its intermediate vectors.
"""
from __future__ import annotations

from pyspark.sql import DataFrame

from repro.core.costmodel import CostBreakdown
from repro.core.jointree import JoinTree

from .common import Gater, ckpt, keycols


def run_com(
    tree: JoinTree,
    data: dict[str, DataFrame],
    order: list[str],
    gater: Gater | None,
    counts: CostBreakdown,
    measure: bool,
    flat_output: bool,
) -> tuple[DataFrame | None, int | None]:
    """Execute the factorized plan; returns (flat result | None, factorized
    row count). The flat result is lazy; factorized sizes are counted
    eagerly (they are the terminal action in factorized-output mode)."""
    order_pos = {c: i for i, c in enumerate(order)}
    root = tree.root
    driver = data[root]
    if gater:
        driver = gater.gate_children(driver, root, order_pos, counts, measure)
    driver = ckpt(driver)
    spine: dict[str, DataFrame] = {root: driver}
    alive: dict[str, DataFrame] = {root: ckpt(driver.select(keycols(tree, root)).distinct())}

    for l in order:
        p = tree.parent[l]
        asp = spine[p]
        for a in tree.path_from_root(p):
            asp = asp.join(alive[a], on=keycols(tree, a), how="left_semi")
        if measure:
            # The probe-side frame is consumed once; pin it only when the
            # count action would otherwise recompute it.
            asp = ckpt(asp)
            counts.hash_probes[l] = float(asp.count())
        pcol, ccol = tree.join_cols[l]
        sp = asp.join(data[l], on=asp[pcol] == data[l][ccol], how="inner")
        sp = ckpt(sp)
        if measure:
            counts.tuples_generated += sp.count()
        if gater and tree.children(l):
            sp = ckpt(gater.gate_children(sp, l, order_pos, counts, measure))
        spine[l] = sp
        alive[l] = ckpt(sp.select(keycols(tree, l)).distinct())
        # Upward death propagation along the path to the root.
        child = l
        for a in tree.path_to_root(l)[1:]:
            surv = (
                spine[child]
                .join(alive[child], on=keycols(tree, child), how="left_semi")
                .select(keycols(tree, a))
                .distinct()
            )
            alive[a] = ckpt(alive[a].join(surv, on=keycols(tree, a), how="left_semi"))
            child = a

    final: dict[str, DataFrame] = {}
    count_fact = measure or not flat_output
    fact_rows = 0 if count_fact else None
    for n in [root, *order]:
        sp = spine[n]
        for a in tree.path_from_root(n):
            sp = sp.join(alive[a], on=keycols(tree, a), how="left_semi")
        if count_fact:
            sp = ckpt(sp)
            fact_rows += sp.count()
        final[n] = sp

    if not flat_output:
        return None, fact_rows

    flat = final[root]
    for c in tree.bfs_order()[1:]:
        p = tree.parent[c]
        own = data[c].columns
        piece = final[c].select(keycols(tree, p) + own)
        flat = flat.join(piece, on=keycols(tree, p), how="inner")
        if measure:
            flat = ckpt(flat)
            counts.expansion_tuples += flat.count()
    return flat, fact_rows
