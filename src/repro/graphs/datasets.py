"""Laptop-scale synthetic analogs of the paper's evaluation datasets.

Each entry substitutes one of Table 3's real graphs (see DESIGN.md §4):
the analog preserves the *character* that drives the algorithms'
convergence behaviour — average degree, in/out skew, and core structure —
at ~10²–10³× smaller |V|/|E|. ``PAPER_TABLE3`` records the original
numbers so EXPERIMENTS.md can place them side by side.
"""
from __future__ import annotations

from dataclasses import dataclass
from functools import lru_cache
from typing import Callable

from repro.graphs.generators import (
    Edge,
    chung_lu_digraph,
    er_digraph,
    near_dag_digraph,
    planted_core_digraph,
)


@dataclass(frozen=True)
class DatasetSpec:
    """A named synthetic analog: ``maker()`` -> deterministic edge list."""

    name: str
    paper_name: str
    maker: Callable[[], list[Edge]]
    character: str


SPECS: dict[str, DatasetSpec] = {
    "WV": DatasetSpec(
        "WV",
        "Wiki-vote",
        lambda: planted_core_digraph(
            500, 6_500, core_size=70, core_in_deg=13, core_out_alpha=0.3,
            alpha_in=0.75, alpha_out=0.75, seed=11,
        ),
        "dense voting graph, moderate skew, deep mutual core (k_max > l_max)",
    ),
    "EE": DatasetSpec(
        "EE",
        "Email-EuAll",
        lambda: planted_core_digraph(
            4_000, 5_700, core_size=40, core_in_deg=8, core_regular=True,
            alpha_in=0.95, alpha_out=0.95, seed=22,
        ),
        "very sparse hub-and-spoke graph with a small balanced core "
        "(k_max = l_max)",
    ),
    "SL": DatasetSpec(
        "SL",
        "Slashdot",
        lambda: planted_core_digraph(
            1_200, 12_500, core_size=90, core_in_deg=16, core_out_alpha=1.1,
            alpha_in=1.0, alpha_out=0.25, seed=33,
        ),
        "social graph, strong in-skew + emitter-skewed core: k_max >> l_max",
    ),
    "AM": DatasetSpec(
        "AM",
        "Amazon",
        lambda: planted_core_digraph(
            2_500, 19_500, core_size=60, core_in_deg=9, core_regular=True,
            alpha_in=0.0, alpha_out=0.0, seed=44,
        ),
        "near-regular co-purchase graph (uniform background + balanced "
        "core): k_max ~= l_max",
    ),
    "CT": DatasetSpec(
        "CT",
        "Citation",
        lambda: near_dag_digraph(4_000, 17_500, noise=0.02, seed=55),
        "citation near-DAG: tiny k_max = l_max (paper: 1/1)",
    ),
}

#: Table 3 of the paper (the five datasets used by Table 4 / Exp-1).
PAPER_TABLE3 = {
    "WV": dict(V=7_115, E=103_689, deg_avg=14.57, kmax=19, lmax=15),
    "EE": dict(V=265_214, E=420_045, deg_avg=1.58, kmax=28, lmax=28),
    "SL": dict(V=82_168, E=948_464, deg_avg=11.54, kmax=54, lmax=9),
    "AM": dict(V=400_727, E=3_200_440, deg_avg=7.99, kmax=10, lmax=10),
    "CT": dict(V=3_764_117, E=16_518_948, deg_avg=4.37, kmax=1, lmax=1),
}

#: Table 4 of the paper (Exp-1: iterations until convergence).
PAPER_TABLE4 = {
    "upper_bound": dict(WV=1_167, EE=7_636, SL=5_064, AM=2_757, CT=793),
    "AC-V": {
        "phase1": dict(WV=19, EE=17, SL=40, AM=16, CT=32),
        "phase2": dict(WV=32, EE=19, SL=53, AM=64, CT=32),
        "phase3": dict(WV=33, EE=22, SL=61, AM=61, CT=2),
        "total": dict(WV=84, EE=58, SL=154, AM=141, CT=66),
    },
    "AC-B": {
        "phase1": dict(WV=14, EE=14, SL=35, AM=13, CT=28),
        "phase2": dict(WV=15, EE=7, SL=43, AM=30, CT=28),
        "phase3": dict(WV=16, EE=21, SL=45, AM=25, CT=2),
        "total": dict(WV=45, EE=42, SL=123, AM=68, CT=58),
    },
    "SC-V": dict(WV=33, EE=19, SL=61, AM=65, CT=2),
    "SC-B": dict(WV=17, EE=6, SL=46, AM=25, CT=2),
}


def paper_figure2() -> list[Edge]:
    """The 8-vertex graph of the paper's Figure 2, reconstructed from the
    constraints stated in the text: the degree rows of Table 1
    (``iH⁰`` = in-degrees 3,2,2,2,2,3,1,2 and ``oH⁰`` = out-degrees
    3,0,0,5,3,2,2,2), ``in(v1) = {v4, v6, v7}`` (Example 4.1), the core
    memberships of Example 3.1 / Section 3 (H1 = (2,2)-core =
    {v1,v4,v5,v6}, H2 = (2,0)-core = V∖{v7}, H3 = (1,1)-core = V∖{v2,v3},
    (0,2)-core = H1 ∪ {v7}), and the D-index values of Table 2. The
    golden tests verify every one of those published facts against this
    edge list.
    """
    return [
        # H1-internal edges (each of v1,v4,v5,v6 has in=out=2 inside H1)
        (4, 1), (6, 1), (1, 5), (1, 6), (4, 5), (5, 4), (5, 6), (6, 4),
        # v7 feeds the core: v7->v1 (Example 4.1) and v7->v6
        (7, 1), (7, 6),
        # v8's edges and the sink vertices v2, v3 (out-degree 0)
        (8, 7), (8, 3), (1, 8), (4, 8),
        (4, 2), (4, 3), (5, 2),
    ]


@lru_cache(maxsize=None)
def load(name: str) -> tuple[Edge, ...]:
    """Deterministic edge list for a named analog (cached)."""
    if name not in SPECS:
        raise KeyError(f"unknown dataset {name!r}; have {sorted(SPECS)}")
    return tuple(SPECS[name].maker())
