"""Brute-force D-core oracle for tiny graphs.

Computes a (k,l)-core directly from Definition 3.1 by repeatedly deleting
violators, and full decompositions by sweeping (k, l). Exponentially
slower than peeling but independent of it — the two oracles cross-check
each other in the test suite.
"""
from __future__ import annotations

from collections import defaultdict

Edge = tuple[int, int]


def _adj(edges: list[Edge]):
    seen = set()
    in_n, out_n = defaultdict(set), defaultdict(set)
    verts = set()
    for u, v in edges:
        verts.add(u)
        verts.add(v)
        if u == v or (u, v) in seen:
            continue
        seen.add((u, v))
        out_n[u].add(v)
        in_n[v].add(u)
    return verts, in_n, out_n


def kl_core(edges: list[Edge], k: int, l: int) -> set[int]:
    """Vertex set of the (k, l)-core (possibly empty)."""
    verts, in_n, out_n = _adj(edges)
    alive = set(verts)
    while True:
        bad = {
            v
            for v in alive
            if len(in_n[v] & alive) < k or len(out_n[v] & alive) < l
        }
        if not bad:
            return alive
        alive -= bad


def anchored_bruteforce(edges: list[Edge]) -> dict[int, list[int]]:
    """Φ(v) for every vertex: anchored[v][k] = l_max(k, v)."""
    verts, _, _ = _adj(edges)
    anchored: dict[int, list[int]] = {v: [] for v in verts}
    k = 0
    while True:
        base = kl_core(edges, k, 0)
        if not base:
            break
        lmax_of = {v: 0 for v in base}
        l = 1
        while True:
            core = kl_core(edges, k, l)
            if not core:
                break
            for v in core:
                lmax_of[v] = l
            l += 1
        for v, lm in lmax_of.items():
            anchored[v].append(lm)
        k += 1
    return anchored


def skyline_bruteforce(edges: list[Edge]) -> dict[int, list[tuple[int, int]]]:
    """SC(v) for every vertex, via the anchored sweep + skyline filter."""
    from repro.core.dindex import skyline

    return {
        v: skyline(list(enumerate(arr)))
        for v, arr in anchored_bruteforce(edges).items()
    }
