"""T8 bench (Fig. 10): the adaptive step (A) vs the global rerun (G) on
the same accumulated graph — the paper's 0.55 s vs 122 s contrast."""
import numpy as np
import pytest

from benchmarks.bench_t7_adaptive import _split
from benchmarks.conftest import ETA, K


@pytest.fixture(scope="module")
def setup(bench_tx_pdf, bench_adj):
    from repro.graph import adjacency_from_pandas, build_tx_graph_pandas
    from repro.txallo import g_txallo
    from repro.txallo.a_txallo import map_prev_labels

    hist, new = _split(bench_tx_pdf)
    adj_hist = adjacency_from_pandas(build_tx_graph_pandas(hist))
    base = g_txallo(adj_hist, k=K, eta=ETA, lam=len(hist) / K)
    prev = map_prev_labels(bench_adj, adj_hist.nodes, base)
    hot_accounts = np.unique(np.concatenate([np.asarray(a) for a in new["accounts"]]))
    hot = bench_adj.index_of(hot_accounts)
    return prev, hot, len(bench_tx_pdf) / K


def test_t8_adaptive_step(benchmark, bench_adj, setup):
    from repro.txallo import a_txallo

    prev, hot, lam = setup

    def run():
        return a_txallo(bench_adj, prev, hot, k=K, eta=ETA, lam=lam)

    benchmark(run)


def test_t8_global_rerun(benchmark, bench_adj, setup):
    from repro.txallo import g_txallo

    *_, lam = setup

    def run():
        return g_txallo(bench_adj, k=K, eta=ETA, lam=lam)

    benchmark.pedantic(run, rounds=3, iterations=1)
