"""Graph partitioners (Exp-6's four strategies).

All partitioners return a routing table ``{vid: block}`` covering every
endpoint of the edge list. HASH and SEG mirror GRAPE's built-ins; FENNEL
and METIS are re-implemented at laptop scale (METIS itself is unavailable
offline — METIS-lite is a BFS-contiguous locality partitioner preserving
the property Exp-6 exercises: high locality / fewer cross-block messages,
worse balance than HASH; see DESIGN.md §4).
"""
from __future__ import annotations

import math
from collections import defaultdict, deque

Edge = tuple[int, int]


def _vertices(edges: list[Edge]) -> list[int]:
    vs: set[int] = set()
    for u, v in edges:
        vs.add(u)
        vs.add(v)
    return sorted(vs)


def _undirected_adj(edges: list[Edge]) -> dict[int, set[int]]:
    adj: dict[int, set[int]] = defaultdict(set)
    for u, v in edges:
        if u != v:
            adj[u].add(v)
            adj[v].add(u)
    for v in _vertices(edges):
        adj.setdefault(v, set())
    return adj


def hash_partition(edges: list[Edge], n_blocks: int) -> dict[int, int]:
    """GRAPE HASH: block = vid % N (balanced, locality-blind)."""
    return {v: v % n_blocks for v in _vertices(edges)}


def seg_partition(edges: list[Edge], n_blocks: int) -> dict[int, int]:
    """GRAPE SEG: contiguous id ranges, block = rank // ceil(n/N)."""
    vs = _vertices(edges)
    c = math.ceil(len(vs) / n_blocks) or 1
    return {v: i // c for i, v in enumerate(vs)}


def fennel_partition(
    edges: list[Edge], n_blocks: int, gamma: float = 1.5
) -> dict[int, int]:
    """FENNEL-lite: stream vertices in id order, placing each in the block
    maximising |N(v) ∩ block| − α·γ/2·|block|^(γ−1) (Tsourakakis et al.)."""
    adj = _undirected_adj(edges)
    vs = _vertices(edges)
    n, m = len(vs), sum(len(a) for a in adj.values()) // 2
    alpha = (m * n_blocks ** (gamma - 1)) / max(n, 1) ** gamma if n else 0.0
    sizes = [0] * n_blocks
    part: dict[int, int] = {}
    for v in vs:
        best_b, best_score = 0, -math.inf
        for b in range(n_blocks):
            gain = sum(1 for u in adj[v] if part.get(u) == b)
            score = gain - alpha * gamma / 2 * sizes[b] ** (gamma - 1)
            if score > best_score:
                best_b, best_score = b, score
        part[v] = best_b
        sizes[best_b] += 1
    return part


def metis_lite_partition(edges: list[Edge], n_blocks: int) -> dict[int, int]:
    """METIS-lite: DFS ordering over the undirected graph (restarting per
    component), chopped into contiguous chunks. DFS keeps tight
    communities contiguous in the ordering (BFS interleaves them with
    their ring/bridge neighbors), giving METIS-style high-locality
    blocks."""
    adj = _undirected_adj(edges)
    vs = _vertices(edges)
    order: list[int] = []
    seen: set[int] = set()
    for start in vs:
        if start in seen:
            continue
        stack = [start]
        while stack:
            v = stack.pop()
            if v in seen:
                continue
            seen.add(v)
            order.append(v)
            for u in sorted(adj[v], reverse=True):
                if u not in seen:
                    stack.append(u)
    c = math.ceil(len(order) / n_blocks) or 1
    return {v: i // c for i, v in enumerate(order)}


PARTITIONERS = {
    "hash": hash_partition,
    "seg": seg_partition,
    "fennel": fennel_partition,
    "metis": metis_lite_partition,
}


def edge_cut(edges: list[Edge], part: dict[int, int]) -> float:
    """Fraction of edges whose endpoints land in different blocks."""
    if not edges:
        return 0.0
    crossing = sum(1 for u, v in edges if part[u] != part[v])
    return crossing / len(edges)


def block_sizes(part: dict[int, int]) -> list[int]:
    sizes: dict[int, int] = defaultdict(int)
    for b in part.values():
        sizes[b] += 1
    return [sizes[b] for b in sorted(sizes)]
