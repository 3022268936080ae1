"""Exhaustive CTP result enumeration — the test oracle for §4 algorithms.

Enumerates every edge subset (small graphs only) and keeps exactly those
satisfying Def. 2.8: a tree containing one node from each seed set, minimal
(every leaf is a seed, no second node from any set). Supports the UNI,
LABEL and MAX filters so filtered searches can be checked too.
"""
from __future__ import annotations

from itertools import combinations

from ..graph.model import LocalGraph
from .bft import is_unidirectional
from .tree import ResultTree

_MAX_EDGES_EXHAUSTIVE = 22


def enumerate_results(
    g: LocalGraph,
    seed_sets: list[list[int]],
    *,
    uni: bool = False,
    labels: frozenset[str] | None = None,
    max_edges: int | None = None,
) -> set[ResultTree]:
    node_sets: dict[int, int] = {}
    m = len(seed_sets)
    full = 0
    for i, nodes in enumerate(seed_sets):
        full |= 1 << i
        for n in nodes:
            node_sets[n] = node_sets.get(n, 0) | (1 << i)

    eligible = [
        e for e in sorted(g.edges)
        if labels is None or g.edges[e].label in labels
    ]
    if len(eligible) > _MAX_EDGES_EXHAUSTIVE:
        raise ValueError(
            f"graph too large for exhaustive enumeration ({len(eligible)} edges)"
        )
    out: set[ResultTree] = set()

    # 0-edge results: a node belonging to every seed set.
    for n, bits in node_sets.items():
        if bits == full:
            out.add(
                ResultTree(
                    frozenset(),
                    frozenset((n,)),
                    frozenset((i, n) for i in range(m) if bits >> i & 1),
                )
            )

    top = len(eligible) if max_edges is None else min(max_edges, len(eligible))
    for k in range(1, top + 1):
        for combo in combinations(eligible, k):
            if _is_result(g, combo, node_sets, full, m, uni):
                seeds = frozenset(
                    (i, n)
                    for e in combo
                    for n in g.edge_endpoints(e)
                    for i in range(m)
                    if node_sets.get(n, 0) >> i & 1
                )
                nodes = frozenset(
                    n for e in combo for n in g.edge_endpoints(e)
                )
                out.add(ResultTree(frozenset(combo), nodes, seeds))
    return out


def _is_result(
    g: LocalGraph,
    combo: tuple[int, ...],
    node_sets: dict[int, int],
    full: int,
    m: int,
    uni: bool,
) -> bool:
    deg: dict[int, int] = {}
    adj: dict[int, list[int]] = {}
    for e in combo:
        s, d = g.edge_endpoints(e)
        deg[s] = deg.get(s, 0) + 1
        deg[d] = deg.get(d, 0) + 1
        adj.setdefault(s, []).append(d)
        adj.setdefault(d, []).append(s)
    nodes = set(deg)
    # Tree: connected with |N| = |E| + 1.
    if len(nodes) != len(combo) + 1:
        return False
    start = next(iter(nodes))
    seen = {start}
    stack = [start]
    while stack:
        for v in adj[stack.pop()]:
            if v not in seen:
                seen.add(v)
                stack.append(v)
    if len(seen) != len(nodes):
        return False
    # Exactly one node per seed set; all sets covered.
    per_set = [0] * m
    for n in nodes:
        bits = node_sets.get(n, 0)
        for i in range(m):
            if bits >> i & 1:
                per_set[i] += 1
    if any(c != 1 for c in per_set):
        return False
    # Minimality: every leaf is a seed.
    for n, c in deg.items():
        if c == 1 and not node_sets.get(n, 0):
            return False
    if uni and not is_unidirectional(frozenset(combo), g):
        return False
    return True
