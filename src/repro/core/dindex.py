"""D-index kernels (Section 5, Definitions 5.3/5.4, Algorithm 6).

A *skyline* here is a set of mutually non-dominated ``(k, l)`` pairs.
``(k', l') <= (k, l)`` iff ``k' <= k`` and ``l' <= l`` (Definition 5.1).

The optimized n-order D-index computation follows the paper's
optimizations and sharpens the dominance counting:

* Optimization-1: candidate ranges bounded by ``k_hi = H({max-k of each
  in-neighbor})`` and ``l_hi = H({max-l of each out-neighbor})``, plus
  ``l_min`` skyline pruning while scanning ``k`` downwards.
* Optimization-2: one D-index computation over *neighbors* (a neighbor
  supports a candidate ``(k, l)`` if any pair of its skyline
  dominates-or-equals it) instead of one per combinatorial instance of
  neighbor-pair choices. We precompute, per neighbor, the step function
  ``maxl(k) = max{l' : (k', l') in skyline, k' >= k}`` and sort it
  column-wise, so each candidate check is a binary search instead of a
  scan over all neighbors — this matters for hub vertices.
* Optimization-3 (tight initialization) lives in
  :mod:`repro.core.skyline`.

A brute-force reference (:func:`n_order_d_index_bruteforce`) backs the
property tests.
"""
from __future__ import annotations

import numpy as np

from repro.framework.hindex import h_index

Pair = tuple[int, int]


def dominates_or_equal(small: Pair, big: Pair) -> bool:
    """Return True iff ``small <= big`` component-wise (Definition 5.1)."""
    return small[0] <= big[0] and small[1] <= big[1]


def skyline(pairs) -> list[Pair]:
    """Maximal non-dominated subset, sorted by k descending.

    On a valid skyline the l values strictly increase as k decreases.
    """
    best: dict[int, int] = {}
    for k, l in pairs:
        if best.get(k, -1) < l:
            best[k] = l
    out: list[Pair] = []
    top_l = -1
    for k in sorted(best, reverse=True):
        if best[k] > top_l:
            out.append((k, best[k]))
            top_l = best[k]
    return out


def _maxl_steps(pairs: list[Pair], k_hi: int) -> np.ndarray:
    """``maxl[k] = max{l' : (k', l') in skyline(pairs), k' >= k}`` for
    k in [0, k_hi]; -1 where no pair reaches k."""
    maxl = np.full(k_hi + 1, -1, dtype=np.int64)
    # skyline() yields k descending with l ascending, so later (smaller-k,
    # larger-l) pairs correctly overwrite the prefix.
    for k, l in skyline(pairs):
        maxl[: min(k, k_hi) + 1] = l
    return maxl


def n_order_d_index(
    in_skylines: list[list[Pair]], out_skylines: list[list[Pair]]
) -> list[Pair]:
    """Algorithm 6: the n-order D-index from the neighbors' skylines.

    Returns the skyline sorted by k descending. ``l_min`` starts at -1 so
    pairs with l == 0 are reachable; the paper's pseudo-code initialises
    it to 0, but its own worked example (Table 2) contains pairs such as
    ``(2, 0)``, which requires scanning down to l = 0.
    """
    k_hi = h_index(max((k for k, _ in s), default=0) for s in in_skylines)
    l_hi = h_index(max((l for _, l in s), default=0) for s in out_skylines)
    # Column-sorted support tables: supports_in[k] = sorted maxl values
    # over in-neighbors; a neighbor supports (k, l) iff its maxl(k) >= l.
    if in_skylines:
        m_in = np.sort(
            np.stack([_maxl_steps(s, k_hi) for s in in_skylines]), axis=0
        )
    else:
        m_in = np.empty((0, k_hi + 1), dtype=np.int64)
    if out_skylines:
        m_out = np.sort(
            np.stack([_maxl_steps(s, k_hi) for s in out_skylines]), axis=0
        )
    else:
        m_out = np.empty((0, k_hi + 1), dtype=np.int64)

    def n_support(m: np.ndarray, k: int, l: int) -> int:
        col = m[:, k]
        return col.size - int(np.searchsorted(col, l, side="left"))

    result: list[Pair] = []
    l_min = -1
    for k in range(k_hi, -1, -1):
        for l in range(l_hi, l_min, -1):
            if n_support(m_in, k, l) < k:
                continue
            if n_support(m_out, k, l) >= l:
                result.append((k, l))
                l_min = l
                break
    return result


def n_order_d_index_bruteforce(
    in_pairs: list[list[Pair]], out_pairs: list[list[Pair]]
) -> list[Pair]:
    """Reference n-order D-index: enumerate every candidate, then skyline."""

    def exists_dom(nbr: list[Pair], k: int, l: int) -> bool:
        return any(dominates_or_equal((k, l), p) for p in nbr)

    qualified: list[Pair] = []
    for k in range(len(in_pairs) + 1):
        for l in range(len(out_pairs) + 1):
            n_in = sum(1 for nbr in in_pairs if exists_dom(nbr, k, l))
            n_out = sum(1 for nbr in out_pairs if exists_dom(nbr, k, l))
            if n_in >= k and n_out >= l:
                qualified.append((k, l))
    return skyline(qualified)


def d_index(r_in: list[Pair], r_out: list[Pair]) -> list[Pair]:
    """Definition 5.3's plain D-index of two pair sets (one pair per
    element). Checked in tests against the paper's worked example;
    the distributed algorithm uses :func:`n_order_d_index`.
    """
    return n_order_d_index_bruteforce([[p] for p in r_in], [[p] for p in r_out])
