"""Rooted join-tree IR with per-edge statistics.

A :class:`JoinTree` describes an acyclic multi-way join query the way the
paper does (§2.1, §3): a *driver* (root) relation joined left-deep with the
remaining relations, where the precedence constraint is that a relation may
only be joined after its parent in the tree (no cartesian products).

Each non-root node ``c`` carries the statistics of the join operator
``⋈ R_c`` probed *from* its parent:

- ``m[c]``  — match probability (P[a parent-side tuple finds ≥1 match]),
- ``fo[c]`` — fanout (mean number of matches, given ≥1),

so that the classical selectivity is ``s_c = m_c * fo_c`` (§3.1).

The tree also stores per-node relation sizes (needed for the semi-join
phase-1 cost, §3.6) and — for trees bound to actual data — the join-column
names for each edge.
"""
from __future__ import annotations

import itertools
import random
from dataclasses import dataclass, field
from typing import Iterator


@dataclass(frozen=True)
class EdgeStats:
    """Statistics of the join operator probing from parent into child."""

    m: float
    fo: float

    def __post_init__(self) -> None:
        if not (0.0 <= self.m <= 1.0):
            raise ValueError(f"match probability must be in [0,1], got {self.m}")
        if self.fo < 0.0:
            raise ValueError(f"fanout must be >= 0, got {self.fo}")

    @property
    def s(self) -> float:
        """Classical join selectivity s = m * fo."""
        return self.m * self.fo


@dataclass
class JoinTree:
    """Rooted join tree: ``root`` plus ``parent`` pointers for every other node.

    ``stats[c]`` are the (m, fo) of the edge parent(c) -> c; ``size[n]`` is
    |R_n| (optional, defaults to 0 — only needed for SJ phase-1 costing);
    ``join_cols[c] = (parent_col, child_col)`` binds an edge to data columns
    (optional — analytic experiments don't need it).
    """

    root: str
    parent: dict[str, str]
    stats: dict[str, EdgeStats]
    size: dict[str, float] = field(default_factory=dict)
    join_cols: dict[str, tuple[str, str]] = field(default_factory=dict)

    def __post_init__(self) -> None:
        if self.root in self.parent:
            raise ValueError("root must not have a parent")
        for c, p in self.parent.items():
            if p != self.root and p not in self.parent:
                raise ValueError(f"parent {p!r} of {c!r} is not a node")
            if c not in self.stats:
                raise ValueError(f"missing stats for edge to {c!r}")
        for c in self.stats:
            if c not in self.parent:
                raise ValueError(f"stats for unknown node {c!r}")
        # Reject cycles / unreachable nodes: walking up from every node must
        # reach the root without revisiting.
        for c in self.parent:
            seen = {c}
            cur = c
            while cur != self.root:
                cur = self.parent[cur]
                if cur in seen:
                    raise ValueError(f"cycle through {c!r}")
                seen.add(cur)
        self._children: dict[str, list[str]] = {n: [] for n in self.nodes}
        for c, p in self.parent.items():
            self._children[p].append(c)

    # ---- structure ------------------------------------------------------

    @property
    def nodes(self) -> list[str]:
        return [self.root, *self.parent.keys()]

    @property
    def nonroot(self) -> list[str]:
        return list(self.parent.keys())

    def children(self, n: str) -> list[str]:
        return self._children[n]

    def path_to_root(self, n: str) -> list[str]:
        """Nodes from ``n`` up to and including the root."""
        out = [n]
        while out[-1] != self.root:
            out.append(self.parent[out[-1]])
        return out

    def path_from_root(self, n: str) -> list[str]:
        """Nodes from the root down to and including ``n``."""
        return list(reversed(self.path_to_root(n)))

    def depth(self, n: str) -> int:
        return len(self.path_to_root(n)) - 1

    def subtree(self, n: str) -> list[str]:
        """All nodes in the subtree rooted at ``n`` (preorder)."""
        out = [n]
        stack = list(self.children(n))
        while stack:
            x = stack.pop()
            out.append(x)
            stack.extend(self.children(x))
        return out

    def bottom_up(self) -> list[str]:
        """Nodes ordered so every child precedes its parent."""
        order = self.bfs_order()
        return list(reversed(order))

    def bfs_order(self) -> list[str]:
        out, frontier = [], [self.root]
        while frontier:
            n = frontier.pop(0)
            out.append(n)
            frontier.extend(self.children(n))
        return out

    # ---- join orders ----------------------------------------------------

    def is_valid_order(self, order: list[str]) -> bool:
        """A valid left-deep order joins each node after its parent."""
        if sorted(order) != sorted(self.nonroot):
            return False
        seen = {self.root}
        for n in order:
            if self.parent[n] not in seen:
                return False
            seen.add(n)
        return True

    def valid_orders(self) -> Iterator[list[str]]:
        """All valid left-deep join orders (exponential — small trees only)."""
        for perm in itertools.permutations(self.nonroot):
            if self.is_valid_order(list(perm)):
                yield list(perm)

    def eligible(self, processed: set[str]) -> list[str]:
        """Nodes that may be joined next given the already-joined set."""
        avail = processed | {self.root}
        return [n for n in self.nonroot if n not in processed and self.parent[n] in avail]

    def default_order(self) -> list[str]:
        """BFS order — always valid; a neutral baseline order."""
        return self.bfs_order()[1:]

    # ---- rerooting (driver enumeration) ---------------------------------

    def rerooted(self, new_root: str, stats_for: "StatsProvider") -> "JoinTree":
        """Return the same undirected join graph rooted at ``new_root``.

        Re-rooting flips the probe direction on the edges along the path
        from ``new_root`` to the old root, so their (m, fo) change; the
        caller supplies ``stats_for(parent, child)`` for the new
        directions (see :class:`SymmetricStats`).
        """
        if new_root not in self.nodes:
            raise ValueError(new_root)
        und: dict[str, set[str]] = {n: set() for n in self.nodes}
        for c, p in self.parent.items():
            und[c].add(p)
            und[p].add(c)
        parent: dict[str, str] = {}
        stats: dict[str, EdgeStats] = {}
        frontier, seen = [new_root], {new_root}
        while frontier:
            p = frontier.pop()
            for c in und[p]:
                if c not in seen:
                    seen.add(c)
                    parent[c] = p
                    stats[c] = stats_for(p, c)
                    frontier.append(c)
        jc = {}
        for c, p in parent.items():
            if c in self.join_cols and self.parent.get(c) == p:
                jc[c] = self.join_cols[c]
            elif p in self.join_cols and self.parent.get(p) == c:
                pc, cc = self.join_cols[p]
                jc[c] = (cc, pc)
        return JoinTree(new_root, parent, stats, dict(self.size), jc)


class StatsProvider:
    """Callable giving EdgeStats for an arbitrary probe direction."""

    def __call__(self, parent: str, child: str) -> EdgeStats:  # pragma: no cover
        raise NotImplementedError


@dataclass
class SymmetricStats(StatsProvider):
    """Directional stats table: ``table[(p, c)] -> EdgeStats``.

    For driver enumeration we need (m, fo) for both probe directions of
    every edge; they are related through the relation sizes
    (|R_p| * m_{p->c} * fo_{p->c} = |R_c| * m_{c->p} * fo_{c->p} = #join
    pairs) but not determined by one direction alone, so both are stored.
    """

    table: dict[tuple[str, str], EdgeStats]

    def __call__(self, parent: str, child: str) -> EdgeStats:
        return self.table[(parent, child)]


# ---- constructors for the paper's query shapes --------------------------


def star(n_children: int, stats: dict[str, EdgeStats] | None = None, *, prefix: str = "R") -> JoinTree:
    """Star query: driver joined with ``n_children`` dimension relations."""
    root = f"{prefix}1"
    parent = {f"{prefix}{i + 2}": root for i in range(n_children)}
    st = stats or {c: EdgeStats(0.5, 2.0) for c in parent}
    return JoinTree(root, parent, st)


def path(n_nodes: int, stats: dict[str, EdgeStats] | None = None, *, prefix: str = "R") -> JoinTree:
    """Path query R1 - R2 - ... - Rn rooted at R1."""
    parent = {f"{prefix}{i}": f"{prefix}{i - 1}" for i in range(2, n_nodes + 1)}
    st = stats or {c: EdgeStats(0.5, 2.0) for c in parent}
    return JoinTree(f"{prefix}1", parent, st)


def centered_path(n_nodes: int, stats: dict[str, EdgeStats] | None = None, *, prefix: str = "R") -> JoinTree:
    """Path query rooted at its center relation (the paper's 11-rel path)."""
    if n_nodes < 3:
        raise ValueError("need >= 3 nodes")
    mid = (n_nodes + 1) // 2
    root = f"{prefix}{mid}"
    parent = {}
    for i in range(mid - 1, 0, -1):
        parent[f"{prefix}{i}"] = f"{prefix}{i + 1}"
    for i in range(mid + 1, n_nodes + 1):
        parent[f"{prefix}{i}"] = f"{prefix}{i - 1}"
    st = stats or {c: EdgeStats(0.5, 2.0) for c in parent}
    return JoinTree(root, parent, st)


def snowflake(n_children: int, n_grandchildren: int, stats: dict[str, EdgeStats] | None = None, *, prefix: str = "R") -> JoinTree:
    """Snowflake: driver with ``n_children`` children, each with
    ``n_grandchildren`` children (the paper's 3-2 and 5-1 shapes)."""
    root = f"{prefix}1"
    parent: dict[str, str] = {}
    k = 2
    for _ in range(n_children):
        child = f"{prefix}{k}"
        parent[child] = root
        k += 1
        for _ in range(n_grandchildren):
            parent[f"{prefix}{k}"] = child
            k += 1
    st = stats or {c: EdgeStats(0.5, 2.0) for c in parent}
    return JoinTree(root, parent, st)


def running_example(stats: dict[str, EdgeStats] | None = None) -> JoinTree:
    """The paper's 6-relation running example (Fig 1): R1-R2(A), R2-R3(C),
    R2-R4(D), R1-R5(E), R5-R6(F)."""
    parent = {"R2": "R1", "R3": "R2", "R4": "R2", "R5": "R1", "R6": "R5"}
    st = stats or {c: EdgeStats(0.5, 2.0) for c in parent}
    return JoinTree("R1", parent, st)


def random_tree(
    rng: random.Random,
    *,
    max_nodes: int = 20,
    root_children: tuple[int, int] = (2, 5),
    other_children: tuple[int, int] = (0, 3),
    m_range: tuple[float, float] = (0.05, 0.5),
    fo_range: tuple[float, float] = (1.0, 10.0),
    prefix: str = "R",
) -> JoinTree:
    """Random join tree per the Fig 10 experiment settings.

    The root gets Uniform[root_children] children; every other node gets
    Uniform[other_children] children, generated BFS until ``max_nodes``.
    Edge stats drawn uniformly from ``m_range`` × ``fo_range``.
    """
    root = f"{prefix}1"
    parent: dict[str, str] = {}
    k = 2
    frontier = [root]
    first = True
    while frontier and k <= max_nodes:
        p = frontier.pop(0)
        lo, hi = root_children if first else other_children
        first = False
        for _ in range(rng.randint(lo, hi)):
            if k > max_nodes:
                break
            c = f"{prefix}{k}"
            parent[c] = p
            frontier.append(c)
            k += 1
    if not parent:  # ensure at least one join
        parent[f"{prefix}2"] = root
        k = 3
    stats = {
        c: EdgeStats(rng.uniform(*m_range), rng.uniform(*fo_range)) for c in parent
    }
    return JoinTree(root, parent, stats)
