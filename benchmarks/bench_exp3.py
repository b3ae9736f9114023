"""Exp-3 benchmark (Fig. 4): our algorithms vs the Peeling baseline.

Times the exact centralized peeling and the four distributed variants on
the same graphs, and records the distributed cost model (coordination
rounds, messages/volume) in ``extra_info``. The expected *shape*:

* peeling is fast on one box (the paper's own Appendix F result) but
  needs orders of magnitude more coordination rounds than AC/SC;
* SC ships less volume than AC; block mode ships less than vertex mode.
"""
import pytest

from repro.baseline.peeling import peel_decompose
from repro.core.decompose import decompose
from repro.graphs.datasets import SPECS, load

VARIANTS = [("AC", "vertex"), ("AC", "block"), ("SC", "vertex"), ("SC", "block")]


@pytest.mark.parametrize("name", sorted(SPECS))
def test_bench_peeling_baseline(benchmark, name):
    edges = list(load(name))
    anchored, stats = benchmark.pedantic(
        lambda: peel_decompose(edges), rounds=1, iterations=1, warmup_rounds=0
    )
    benchmark.extra_info.update(
        {"coordinator_rounds": stats.rounds, "messages": stats.messages}
    )
    assert anchored


@pytest.mark.parametrize("name", ["WV", "SL"])
@pytest.mark.parametrize(
    "algo,mode", VARIANTS, ids=[f"{a}-{m[0].upper()}" for a, m in VARIANTS]
)
def test_bench_distributed_vs_peeling(benchmark, name, algo, mode):
    """Round/volume comparison against peeling on the two graphs used by
    the Exp-3 job; asserts the headline orderings."""
    edges = list(load(name))
    _, pstats = peel_decompose(edges)

    res = benchmark.pedantic(
        lambda: decompose(None, edges, algo=algo, mode=mode, n_blocks=8,
                          engine="local"),
        rounds=1, iterations=1, warmup_rounds=0,
    )
    benchmark.extra_info.update(
        {
            "rounds": res.total_rounds,
            "peeling_rounds": pstats.rounds,
            "volume": res.total_volume,
            "messages": res.total_messages,
        }
    )
    # The motivating gap: far fewer coordination rounds than peeling.
    assert res.total_rounds * 3 < pstats.rounds
