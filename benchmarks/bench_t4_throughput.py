"""T4 bench (Fig. 5): graph-level throughput rollup Λ/λ for a fixed
allocation (the optimizer's objective evaluation)."""
from benchmarks.conftest import ETA, K


def test_t4_throughput_rollup(benchmark, bench_adj, bench_lam, bench_txallo_labels):
    from repro.metrics.graphlevel import graph_metrics

    def run():
        return graph_metrics(bench_adj, bench_txallo_labels, K, eta=ETA, lam=bench_lam)

    out = benchmark(run)
    assert out["norm_throughput"] > 1.0
