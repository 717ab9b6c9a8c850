"""Join-order optimization algorithms (§3.4–§3.6).

- :func:`exhaustive_optimal` — Algorithm 1: dynamic programming over
  connected prefixes (every connected subtree containing the driver),
  O(n·2ⁿ) worst case, valid for COM / BVP+COM / STD / BVP+STD because the
  probe count into the next operator depends only on the *set* of already
  joined operators (Thm 3.3 for BVP).
- :func:`greedy_order` — the three §3.4 heuristics: ``"rank"``
  (min selectivity — what rank ordering degenerates to with unit probe
  costs), ``"tuples"`` (min expected tuples after the join), and
  ``"survival"`` (min driver survival probability of the prefix).
- :func:`brute_force_optimal` — all valid permutations; test oracle.
- :func:`optimize` / :func:`optimize_all_drivers` — convenience entry
  points returning (cost, order) per strategy, optionally trying every
  relation as the driver via :meth:`JoinTree.rerooted`.
"""
from __future__ import annotations

from typing import Callable

from .costmodel import (
    CostBreakdown,
    Weights,
    branch_factor,
    com_hash_probes_into,
    expected_output,
    plan_costs,
    sj_optimal_phase2_order,
    std_costs,
)
from .jointree import JoinTree, StatsProvider

HEURISTICS = ("rank", "tuples", "survival")

ProbesFn = Callable[[str, frozenset], float]


def com_probes_fn(tree: JoinTree, n_driver: float, *, bvp: bool = False, eps: float = 0.0) -> ProbesFn:
    """Per-step probe cost for the DP under COM semantics (Eq. 1)."""

    def fn(l: str, processed: frozenset) -> float:
        return com_hash_probes_into(tree, l, set(processed), n_driver, bvp=bvp, eps=eps)

    return fn


def cached_com_probes_fn(tree: JoinTree, n_driver: float) -> ProbesFn:
    """Memoized Eq. 1 probe function for large DP sweeps.

    ``branch_factor(c, S)`` depends on S only through S ∩ subtree(c), so
    results are cached per (node, bitmask of its subtree's processed
    set) — this turns the O(n·2ⁿ) DP over 20-node trees from minutes
    into seconds.
    """
    idx = {n: i for i, n in enumerate(tree.nodes)}
    submask = {n: sum(1 << idx[d] for d in tree.subtree(n)) for n in tree.nodes}
    cache: dict[tuple[str, int], float] = {}

    def bf(c: str, mask: int) -> float:
        key = (c, mask & submask[c])
        hit = cache.get(key)
        if hit is not None:
            return hit
        if not (mask >> idx[c]) & 1:
            val = 1.0
        else:
            st = tree.stats[c]
            prod = 1.0
            for d in tree.children(c):
                prod *= bf(d, mask)
            val = st.m if prod >= 1.0 else st.m * (1.0 - (1.0 - prod) ** st.fo)
        cache[key] = val
        return val

    def fn(l: str, processed: frozenset) -> float:
        mask = 0
        for n in processed:
            mask |= 1 << idx[n]
        p = tree.parent[l]
        path = tree.path_from_root(p)
        pathset = set(path)
        val = n_driver
        for b in path:
            if b != tree.root:
                st = tree.stats[b]
                val *= st.m * st.fo
            for c in tree.children(b):
                if c in pathset or c == l:
                    continue
                val *= bf(c, mask)
        return val

    return fn


def std_probes_fn(tree: JoinTree, n_driver: float) -> ProbesFn:
    """Per-step probe cost under STD semantics (classical §2.1 formula)."""

    def fn(l: str, processed: frozenset) -> float:
        val = n_driver
        for j in processed:
            val *= tree.stats[j].s
        return val

    return fn


def exhaustive_optimal(tree: JoinTree, probes_fn: ProbesFn) -> tuple[float, list[str]]:
    """Algorithm 1: optimal left-deep order for a fixed driver.

    The principle of optimality holds because ``probes_fn(l, S)`` depends
    on the prefix only through the set S, so the best cost of each
    connected prefix extends independently of its internal order.
    """
    n = len(tree.nonroot)
    frontier: dict[frozenset, tuple[float, list[str]]] = {frozenset(): (0.0, [])}
    for _ in range(n):
        nxt: dict[frozenset, tuple[float, list[str]]] = {}
        for S, (cost, order) in frontier.items():
            for l in tree.eligible(set(S)):
                c = cost + probes_fn(l, S)
                T = S | {l}
                if T not in nxt or c < nxt[T][0]:
                    nxt[T] = (c, order + [l])
        frontier = nxt
    (_, (cost, order)), = frontier.items()
    return cost, order


def brute_force_optimal(tree: JoinTree, probes_fn: ProbesFn) -> tuple[float, list[str]]:
    """Enumerate every valid permutation — exponential test oracle."""
    best_cost, best_order = float("inf"), None
    for order in tree.valid_orders():
        cost, S = 0.0, frozenset()
        for l in order:
            cost += probes_fn(l, S)
            S = S | {l}
        if cost < best_cost:
            best_cost, best_order = cost, order
    assert best_order is not None
    return best_cost, best_order


def order_cost(tree: JoinTree, order: list[str], probes_fn: ProbesFn) -> float:
    """Total probe cost of one explicit order under ``probes_fn``."""
    cost, S = 0.0, frozenset()
    for l in order:
        cost += probes_fn(l, S)
        S = S | {l}
    return cost


def greedy_order(
    tree: JoinTree,
    heuristic: str,
    n_driver: float = 1.0,
) -> list[str]:
    """Greedy join order per one of the three §3.4 heuristics.

    All three obey the precedence constraints; ties break on node name so
    results are deterministic.
    """
    if heuristic not in HEURISTICS:
        raise ValueError(f"unknown heuristic {heuristic!r}; expected one of {HEURISTICS}")
    order: list[str] = []
    processed: set[str] = set()
    while len(order) < len(tree.nonroot):
        elig = tree.eligible(processed)
        if heuristic == "rank":
            nxt = min(elig, key=lambda l: (tree.stats[l].s, l))
        elif heuristic == "tuples":
            def tuples_after(l: str) -> float:
                st = tree.stats[l]
                return com_hash_probes_into(tree, l, processed, n_driver) * st.m * st.fo
            nxt = min(elig, key=lambda l: (tuples_after(l), l))
        else:  # survival
            def survival_after(l: str) -> float:
                s2 = processed | {l}
                prod = 1.0
                for c in tree.children(tree.root):
                    prod *= branch_factor(tree, c, s2)
                return prod
            nxt = min(elig, key=lambda l: (survival_after(l), l))
        order.append(nxt)
        processed.add(nxt)
    return order


# --------------------------------------------------------------------------
# Strategy-level optimization
# --------------------------------------------------------------------------


def optimize(
    tree: JoinTree,
    strategy: str,
    n_driver: float | None = None,
    *,
    method: str = "optimal",
    eps: float = 0.0,
    flat_output: bool = True,
    weights: Weights = Weights(),
) -> tuple[float, list[str], CostBreakdown]:
    """Best (weighted cost, order, breakdown) for one strategy and driver.

    ``method``: ``"optimal"`` (Algorithm 1), one of the greedy
    :data:`HEURISTICS`, or ``"default"`` (BFS order). For SJ strategies
    the §3.6 polynomial optimum is used regardless of ``method``.
    """
    n = float(tree.size[tree.root]) if n_driver is None else float(n_driver)
    if strategy.startswith("SJ"):
        order = sj_optimal_phase2_order(tree, com=strategy.endswith("COM"))
        cb = plan_costs(tree, strategy, order, n, eps=eps, flat_output=flat_output)
        return cb.total(weights), order, cb
    if method == "default":
        order = tree.default_order()
    elif method in HEURISTICS:
        order = greedy_order(tree, method, n)
    elif method == "optimal":
        bvp = strategy.startswith("BVP")
        if strategy.endswith("COM"):
            _, order = exhaustive_optimal(tree, com_probes_fn(tree, n, bvp=bvp, eps=eps))
        else:
            # STD probes don't depend on bitvector placement order much;
            # optimize with the STD formula, cost with the full model.
            _, order = exhaustive_optimal(tree, std_probes_fn(tree, n))
    else:
        raise ValueError(f"unknown method {method!r}")
    cb = plan_costs(tree, strategy, order, n, eps=eps, flat_output=flat_output)
    return cb.total(weights), order, cb


def optimize_all_drivers(
    tree: JoinTree,
    strategy: str,
    stats_for: StatsProvider,
    sizes: dict[str, float],
    **kw,
) -> tuple[float, str, list[str]]:
    """Try every relation as the driver (linear blow-up, §3.5) and return
    the best (cost, driver, order). ``stats_for`` supplies per-direction
    edge stats for the re-rooted trees."""
    best = (float("inf"), tree.root, tree.default_order())
    for drv in tree.nodes:
        t = tree.rerooted(drv, stats_for)
        t.size.update(sizes)
        cost, order, _ = optimize(t, strategy, sizes[drv], **kw)
        if cost < best[0]:
            best = (cost, drv, order)
    return best


def worst_case_tree_for_heuristics(f: float) -> JoinTree:
    """Thm 3.2 construction: an m=0 operator hidden under a high-fanout
    operator, making every greedy heuristic a factor ≥ f worse.

    R1 — Rgood(m=1, fo=f) — Rdead(m=0), plus a long chain of near-free
    decoys (m=1-δ, fo=1) hanging off R1. The optimal plan pays N(1+f) on
    Rgood→Rdead, after which the driver survival is 0 and every remaining
    probe count is 0. All three greedy heuristics prefer the decoys
    (smaller selectivity / tuples / survival than the fo=f operator) and
    grind through the whole chain at ~N probes each before touching Rgood.
    """
    from .jointree import EdgeStats

    k = int(1.5 * f * (1.0 + f)) + 2
    delta = 1.0 / (10.0 * k)
    parent = {"Rgood": "R1", "Rdead": "Rgood", "D1": "R1"}
    stats = {
        "Rgood": EdgeStats(1.0, max(f, 1.0)),
        "Rdead": EdgeStats(0.0, 1.0),
        "D1": EdgeStats(1.0 - delta, 1.0),
    }
    for i in range(2, k + 1):
        parent[f"D{i}"] = f"D{i - 1}"
        stats[f"D{i}"] = EdgeStats(1.0 - delta, 1.0)
    return JoinTree("R1", parent, stats)


__all__ = [
    "HEURISTICS",
    "exhaustive_optimal",
    "brute_force_optimal",
    "greedy_order",
    "order_cost",
    "com_probes_fn",
    "std_probes_fn",
    "optimize",
    "optimize_all_drivers",
    "worst_case_tree_for_heuristics",
    "expected_output",
    "std_costs",
]
