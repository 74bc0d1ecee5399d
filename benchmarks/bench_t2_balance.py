"""T2 bench (Fig. 3): the Spark metric pipeline computing ρ (and the rest
of the per-shard stats) for a fixed allocation."""
from benchmarks.conftest import ETA, K


def test_t2_spark_metric_pipeline(benchmark, spark, bench_tx_df, bench_adj, bench_txallo_labels):
    from repro.metrics.blockchain import evaluate
    from repro.sim.runner import alloc_to_df

    alloc_df = alloc_to_df(spark, bench_adj, bench_txallo_labels)

    def run():
        return evaluate(bench_tx_df, alloc_df, k=K, eta=ETA)

    m = benchmark.pedantic(run, rounds=3, iterations=1)
    assert m.rho >= 0.0
    assert len(m.sigmas) == K
