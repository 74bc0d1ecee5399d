"""T1 bench (Fig. 2): the γ pipeline — G-TxAllo allocation + graph-level
cross-shard ratio at k=20, η=2."""
from benchmarks.conftest import ETA, K


def test_t1_txallo_allocation_and_gamma(benchmark, bench_adj, bench_lam):
    from repro.metrics.graphlevel import graph_gamma
    from repro.txallo import g_txallo

    def run():
        labels = g_txallo(bench_adj, k=K, eta=ETA, lam=bench_lam)
        return graph_gamma(bench_adj, labels)

    gamma = benchmark.pedantic(run, rounds=3, iterations=1)
    assert 0.0 < gamma < 0.5  # far below the ~0.95 random baseline
