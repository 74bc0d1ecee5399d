"""T6 bench (Fig. 8): allocation running time per method.

The pytest-benchmark medians of these four benches ARE the T6 table at
bench scale: the paper's ordering random < G-TxAllo < METIS < Shard
Scheduler must hold (Shard Scheduler's per-transaction loop dominates).
"""
import pytest

from benchmarks.conftest import ETA, K


@pytest.mark.parametrize("method", ["random", "metis", "scheduler", "txallo"])
def test_t6_allocation_runtime(benchmark, method, bench_adj, bench_tx_pdf, bench_lam):
    from repro.sim.runner import allocate

    def run():
        return allocate(
            method, bench_adj, k=K, eta=ETA, lam=bench_lam, tx_pdf=bench_tx_pdf
        )

    res = benchmark.pedantic(run, rounds=3, iterations=1)
    assert len(res.labels) == bench_adj.n
