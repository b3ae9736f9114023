"""Brute-force oracle tests on hand-analysable graphs, plus the D-core
structural properties of Section 3."""
import itertools

import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.baseline.bruteforce import anchored_bruteforce, kl_core, skyline_bruteforce


def complete_digraph(n):
    return [(u, v) for u in range(n) for v in range(n) if u != v]


def directed_cycle(n):
    return [(i, (i + 1) % n) for i in range(n)]


def chain(n):
    return [(i, i + 1) for i in range(n - 1)]


def test_complete_digraph_k4():
    """K4: every vertex has in = out = 3 -> single skyline (3, 3)."""
    edges = complete_digraph(4)
    assert kl_core(edges, 3, 3) == {0, 1, 2, 3}
    assert kl_core(edges, 4, 0) == set()
    assert kl_core(edges, 0, 4) == set()
    anchored = anchored_bruteforce(edges)
    assert anchored == {v: [3, 3, 3, 3] for v in range(4)}
    assert skyline_bruteforce(edges) == {v: [(3, 3)] for v in range(4)}


def test_directed_cycle():
    """A directed cycle is exactly a (1,1)-core."""
    edges = directed_cycle(6)
    assert kl_core(edges, 1, 1) == set(range(6))
    assert kl_core(edges, 2, 0) == set()
    assert kl_core(edges, 0, 2) == set()
    assert skyline_bruteforce(edges) == {v: [(1, 1)] for v in range(6)}


def test_chain_is_coreless():
    """A simple path has empty (1,1)-core; only (0,0)/(1,0)/(0,1)-cores."""
    edges = chain(5)
    assert kl_core(edges, 1, 1) == set()
    assert kl_core(edges, 0, 1) == set()  # the tail peels everything
    assert kl_core(edges, 1, 0) == set()
    anchored = anchored_bruteforce(edges)
    assert all(arr == [0] for arr in anchored.values())


def test_two_cycles_sharing_a_vertex():
    ed = directed_cycle(3) + [(0, 10), (10, 11), (11, 0)]
    core = kl_core(ed, 1, 1)
    assert core == {0, 1, 2, 10, 11}


def test_kl_core_maximality_and_uniqueness():
    """Definition 3.1: the core is the unique maximal qualifying set —
    no strict superset of it qualifies."""
    edges = directed_cycle(4) + [(0, 2), (2, 0)]
    core = kl_core(edges, 1, 1)
    assert core == {0, 1, 2, 3}


digraph_st = st.lists(
    st.tuples(st.integers(0, 7), st.integers(0, 7)).filter(lambda e: e[0] != e[1]),
    max_size=30,
    unique=True,
)


@settings(max_examples=80, deadline=None)
@given(digraph_st)
def test_partial_nesting_property(edges):
    """Property 3.1: (k1,l1)-core ⊆ (k2,l2)-core when k1>=k2, l1>=l2."""
    if not edges:
        return
    cores = {
        (k, l): kl_core(edges, k, l) for k in range(4) for l in range(4)
    }
    for (k1, l1), (k2, l2) in itertools.product(cores, repeat=2):
        if k1 >= k2 and l1 >= l2:
            assert cores[(k1, l1)] <= cores[(k2, l2)]


@settings(max_examples=80, deadline=None)
@given(digraph_st)
def test_core_degrees_satisfied(edges):
    """Every vertex of the (k,l)-core meets both degree constraints
    inside the core (Definition 3.1)."""
    if not edges:
        return
    for k, l in [(1, 1), (2, 1), (1, 2), (2, 2)]:
        core = kl_core(edges, k, l)
        for v in core:
            ind = sum(1 for u, w in set(edges) if w == v and u in core)
            outd = sum(1 for u, w in set(edges) if u == v and w in core)
            assert ind >= k and outd >= l


@settings(max_examples=60, deadline=None)
@given(digraph_st)
def test_anchored_consistent_with_membership(edges):
    """anchored[v][k] == max l with v in the (k,l)-core."""
    if not edges:
        return
    anchored = anchored_bruteforce(edges)
    for v, arr in anchored.items():
        for k, lm in enumerate(arr):
            assert v in kl_core(edges, k, lm)
            assert v not in kl_core(edges, k, lm + 1)
        # beyond k_max(v), v is in no (k,0)-core
        assert v not in kl_core(edges, len(arr), 0)


@settings(max_examples=60, deadline=None)
@given(digraph_st)
def test_anchored_lmax_non_increasing_in_k(edges):
    """Partial nesting makes l_max(k, v) non-increasing in k."""
    for arr in anchored_bruteforce(edges).values():
        assert all(arr[i] >= arr[i + 1] for i in range(len(arr) - 1))
