"""H-index kernel (Section 4 of the paper).

The H-index of a multiset of non-negative integers ``S`` is the maximum
integer ``h`` such that at least ``h`` elements of ``S`` are ``>= h``
(Hirsch index). It is the one-dimensional workhorse behind the paper's
n-order in-/out-H-indexes (Definitions 4.2/4.3) and the candidate-range
bounds of the D-index (Optimization-1, Section 5.3).
"""
from __future__ import annotations

from collections.abc import Iterable

import numpy as np


def h_index(values: Iterable[int]) -> int:
    """Return ``H(S)``: the max ``h`` with at least ``h`` elements ``>= h``.

    ``h_index([]) == 0``; negative inputs are rejected.

    >>> h_index([1, 2, 3, 3, 4, 6])
    3
    """
    a = np.asarray(list(values), dtype=np.int64)
    if a.size == 0:
        return 0
    if (a < 0).any():
        raise ValueError("h_index is defined for non-negative integers")
    # Counting-sort formulation: h = max h with |{x >= h}| >= h. Clip
    # values above n (an element > n can never raise H above n).
    n = a.size
    counts = np.bincount(np.minimum(a, n), minlength=n + 1)
    ge = 0  # number of elements >= h, scanning h from n down to 1
    for h in range(n, 0, -1):
        ge += counts[h]
        if ge >= h:
            return h
    return 0


def h_index_sorted_desc(sorted_desc: np.ndarray) -> int:
    """H-index of an already descending-sorted int array (fast path)."""
    n = sorted_desc.size
    if n == 0:
        return 0
    ranks = np.arange(1, n + 1)
    ok = sorted_desc >= ranks
    if not ok.any():
        return 0
    # ok is a prefix (sorted desc vs increasing rank): last True index + 1.
    return int(np.nonzero(ok)[0][-1] + 1)
