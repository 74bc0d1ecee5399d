"""Tests for the static-experiment harness (sim.runner)."""
import numpy as np
import pytest

from repro.sim.runner import METHODS, AllocResult, alloc_to_df, allocate, method_stats, sweep


class TestAllocate:
    @pytest.mark.parametrize("method", METHODS)
    def test_dispatch(self, adj, tx_pdf, method):
        res = allocate(method, adj, k=4, eta=2.0, lam=len(tx_pdf) / 4, tx_pdf=tx_pdf)
        assert isinstance(res, AllocResult)
        assert len(res.labels) == adj.n
        assert res.labels.min() >= 0 and res.labels.max() < 4
        assert res.seconds >= 0

    def test_unknown_method(self, adj):
        with pytest.raises(ValueError, match="unknown method"):
            allocate("magic", adj, k=4, eta=2.0, lam=1.0)

    def test_scheduler_needs_stream(self, adj):
        with pytest.raises(ValueError, match="tx_pdf"):
            allocate("scheduler", adj, k=4, eta=2.0, lam=1.0)

    def test_scheduler_carries_stream_stats(self, adj, tx_pdf):
        res = allocate("scheduler", adj, k=4, eta=2.0, lam=len(tx_pdf) / 4, tx_pdf=tx_pdf)
        assert res.stream_stats is not None
        n_txs, n_cross, frame = res.stream_stats
        assert n_txs == len(tx_pdf)
        assert len(frame) == 4

    def test_graph_methods_have_no_stream_stats(self, adj, tx_pdf):
        res = allocate("random", adj, k=4, eta=2.0, lam=len(tx_pdf) / 4)
        assert res.stream_stats is None


class TestAllocToDf:
    def test_schema_and_rows(self, spark, adj):
        labels = np.zeros(adj.n, dtype=np.int64)
        df = alloc_to_df(spark, adj, labels)
        assert set(df.columns) == {"account", "shard"}
        assert df.count() == adj.n

    def test_method_stats_spark_path(self, spark, tx_df, adj):
        res = allocate("random", adj, k=4, eta=2.0, lam=1e9)
        n_txs, n_cross, frame = method_stats(spark, "random", tx_df, adj, res)
        assert n_txs == tx_df.count()
        assert set(frame.columns) == {"shard", "n_intra", "n_cross", "lam_hat"}


class TestSweep:
    @pytest.fixture(scope="class")
    def grid(self, spark, tx_df, tx_pdf, adj):
        return sweep(
            spark,
            tx_df,
            adj,
            ks=[2, 4],
            etas=[2.0, 6.0],
            methods=["random", "txallo", "scheduler"],
            tx_pdf=tx_pdf,
        )

    def test_grid_complete(self, grid):
        assert len(grid) == 2 * 2 * 3
        assert set(grid["method"]) == {"random", "txallo", "scheduler"}
        assert set(grid["k"]) == {2, 4}
        assert set(grid["eta"]) == {2.0, 6.0}

    def test_columns(self, grid):
        expect = {
            "method", "k", "eta", "gamma", "rho", "norm_rho", "norm_throughput",
            "avg_latency", "worst_latency", "max_norm_sigma", "min_norm_sigma",
            "alloc_seconds",
        }
        assert set(grid.columns) == expect

    def test_values_sane(self, grid):
        assert grid["gamma"].between(0, 1).all()
        assert (grid["norm_throughput"] > 0).all()
        assert (grid["avg_latency"] >= 1).all()
        assert (grid["worst_latency"] >= 1).all()
        assert (grid["alloc_seconds"] >= 0).all()

    def test_eta_independent_methods_share_gamma(self, grid):
        # random's allocation is eta-independent: same gamma across eta.
        r = grid[grid.method == "random"]
        for k in (2, 4):
            vals = r[r.k == k]["gamma"].unique()
            assert len(vals) == 1

    def test_txallo_beats_random_throughput(self, grid):
        for (k, eta), sub in grid.groupby(["k", "eta"]):
            t = sub[sub.method == "txallo"]["norm_throughput"].iloc[0]
            r = sub[sub.method == "random"]["norm_throughput"].iloc[0]
            assert t >= r * 0.95  # txallo should essentially never lose
