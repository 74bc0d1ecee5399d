"""Tests for transaction-level metrics (§III-A/B): pandas + Spark + oracle.

The tiny 8-tx stream admits full hand computation; the generated stream
checks the Spark pipeline against both the pandas mirror and DuckDB.
"""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.baselines import hash_alloc
from repro.chain.ethdata import TX_SCHEMA
from repro.metrics.blockchain import collect_stats, evaluate, rollup, shard_stats, tx_mu
from repro.metrics.pandas_eval import evaluate_pandas
from repro.oracle import assert_equivalent
from tests.conftest import tiny_tx_pdf

TINY_ALLOC = {1: 0, 2: 0, 3: 0, 4: 1, 5: 1, 6: 1}


@pytest.fixture(scope="module")
def tiny_df(spark):
    return spark.createDataFrame(tiny_tx_pdf().to_dict("records"), schema=TX_SCHEMA)


@pytest.fixture(scope="module")
def tiny_alloc_df(spark):
    return spark.createDataFrame(
        pd.DataFrame({"account": list(TINY_ALLOC), "shard": list(TINY_ALLOC.values())})
    )


class TestTinyHandComputed:
    """Every number below is derived by hand in the module docstring's
    stream: tx5 {2,4} and tx6 {1,2,3,4} are the only cross txs."""

    def test_mu(self, tiny_df, tiny_alloc_df):
        mu = {r["tx_id"]: r["mu"] for r in tx_mu(tiny_df, tiny_alloc_df).collect()}
        assert mu == {0: 1, 1: 1, 2: 1, 3: 1, 4: 1, 5: 2, 6: 2, 7: 1}

    def test_gamma(self, tiny_df, tiny_alloc_df):
        m = evaluate(tiny_df, tiny_alloc_df, k=2, eta=2.0)
        assert m.gamma == pytest.approx(0.25)

    def test_sigmas(self, tiny_df, tiny_alloc_df):
        m = evaluate(tiny_df, tiny_alloc_df, k=2, eta=2.0)
        np.testing.assert_allclose(m.sigmas, [8.0, 6.0])

    def test_sigmas_eta_dependence(self, tiny_df, tiny_alloc_df):
        m = evaluate(tiny_df, tiny_alloc_df, k=2, eta=5.0)
        np.testing.assert_allclose(m.sigmas, [4 + 2 * 5, 2 + 2 * 5])

    def test_rho(self, tiny_df, tiny_alloc_df):
        m = evaluate(tiny_df, tiny_alloc_df, k=2, eta=2.0)
        assert m.rho == pytest.approx(1.0)

    def test_throughput_capacity_clipped(self, tiny_df, tiny_alloc_df):
        # lam defaults to 8/2 = 4; Lambda-hat = [5, 3] -> clipped 2.5 + 2.
        m = evaluate(tiny_df, tiny_alloc_df, k=2, eta=2.0)
        assert m.throughput == pytest.approx(4.5)
        assert m.norm_throughput == pytest.approx(4.5 / 4.0)

    def test_throughput_ample_capacity_counts_each_tx_once(self, tiny_df, tiny_alloc_df):
        # With sigma <= lam everywhere, shares 1/mu sum to exactly |T|.
        m = evaluate(tiny_df, tiny_alloc_df, k=2, eta=2.0, lam=100.0)
        assert m.throughput == pytest.approx(8.0)

    def test_latencies(self, tiny_df, tiny_alloc_df):
        m = evaluate(tiny_df, tiny_alloc_df, k=2, eta=2.0)
        assert m.avg_latency == pytest.approx((1.5 + 4.0 / 3.0) / 2)
        assert m.worst_latency == 2.0

    def test_norm_sigmas(self, tiny_df, tiny_alloc_df):
        m = evaluate(tiny_df, tiny_alloc_df, k=2, eta=2.0)
        np.testing.assert_allclose(m.norm_sigmas, [2.0, 1.5])

    def test_shard_stats_frame(self, tiny_df, tiny_alloc_df):
        stats = shard_stats(tiny_df, tiny_alloc_df).toPandas().sort_values("shard")
        assert stats["n_intra"].tolist() == [4, 2]
        assert stats["n_cross"].tolist() == [2, 2]
        np.testing.assert_allclose(stats["lam_hat"], [5.0, 3.0])


class TestPandasMirror:
    def test_tiny_matches_spark(self, tiny_df, tiny_alloc_df):
        m_s = evaluate(tiny_df, tiny_alloc_df, k=2, eta=2.0)
        m_p = evaluate_pandas(tiny_tx_pdf(), TINY_ALLOC, k=2, eta=2.0)
        assert m_p.gamma == m_s.gamma
        np.testing.assert_allclose(m_p.sigmas, m_s.sigmas)
        assert m_p.throughput == pytest.approx(m_s.throughput)
        assert m_p.avg_latency == pytest.approx(m_s.avg_latency)

    @pytest.mark.parametrize("k,eta", [(4, 2.0), (8, 6.0), (16, 10.0)])
    def test_generated_matches_spark(self, spark, tx_df, tx_pdf, adj, k, eta):
        labels = hash_alloc(adj.nodes, k)
        alloc_df = spark.createDataFrame(
            pd.DataFrame({"account": adj.nodes, "shard": labels})
        )
        m_s = evaluate(tx_df, alloc_df, k=k, eta=eta)
        m_p = evaluate_pandas(tx_pdf, labels, k=k, eta=eta, accounts=adj.nodes)
        assert m_p.gamma == pytest.approx(m_s.gamma)
        np.testing.assert_allclose(m_p.sigmas, m_s.sigmas, atol=1e-9)
        assert m_p.throughput == pytest.approx(m_s.throughput)
        assert m_p.worst_latency == m_s.worst_latency

    def test_dict_and_array_forms_agree(self, tx_pdf, adj):
        labels = hash_alloc(adj.nodes, 4)
        as_dict = {int(a): int(s) for a, s in zip(adj.nodes, labels)}
        m_a = evaluate_pandas(tx_pdf, labels, k=4, eta=2.0, accounts=adj.nodes)
        m_d = evaluate_pandas(tx_pdf, as_dict, k=4, eta=2.0)
        assert m_a.gamma == m_d.gamma
        np.testing.assert_allclose(m_a.sigmas, m_d.sigmas)

    def test_array_form_requires_accounts(self, tx_pdf):
        with pytest.raises(ValueError):
            evaluate_pandas(tx_pdf, np.zeros(3, dtype=int), k=2, eta=2.0)

    def test_missing_account_raises(self):
        pdf = tiny_tx_pdf()
        with pytest.raises(KeyError):
            evaluate_pandas(pdf, {1: 0}, k=2, eta=2.0)


class TestRollupPlumbing:
    def test_collect_then_rollup_equals_evaluate(self, tiny_df, tiny_alloc_df):
        triple = collect_stats(tiny_df, tiny_alloc_df)
        for eta in (2.0, 6.0, 10.0):
            a = rollup(*triple, k=2, eta=eta)
            b = evaluate(tiny_df, tiny_alloc_df, k=2, eta=eta)
            assert a.gamma == b.gamma
            np.testing.assert_allclose(a.sigmas, b.sigmas)
            assert a.throughput == pytest.approx(b.throughput)

    def test_empty_shards_present(self, tiny_df, tiny_alloc_df):
        m = evaluate(tiny_df, tiny_alloc_df, k=5, eta=2.0)
        assert len(m.sigmas) == 5
        assert (m.sigmas[2:] == 0).all()


class TestOracle:
    def test_mu_vs_duckdb(self, tiny_df, tiny_alloc_df):
        got = tx_mu(tiny_df, tiny_alloc_df).select("tx_id", "mu")
        exploded = tiny_tx_pdf().explode("accounts").rename(columns={"accounts": "account"})
        exploded["account"] = exploded["account"].astype("int64")
        alloc = pd.DataFrame({"account": list(TINY_ALLOC), "shard": list(TINY_ALLOC.values())})
        sql = """
            SELECT e.tx_id, COUNT(DISTINCT a.shard) AS mu
            FROM acc e JOIN alloc a USING (account)
            GROUP BY e.tx_id
        """
        assert_equivalent(got, sql, acc=exploded[["tx_id", "account"]], alloc=alloc)

    def test_shard_stats_vs_duckdb(self, spark, tx_df, tx_pdf, adj):
        labels = hash_alloc(adj.nodes, 6)
        alloc = pd.DataFrame({"account": adj.nodes, "shard": labels})
        alloc_df = spark.createDataFrame(alloc)
        got = shard_stats(tx_df, alloc_df).select("shard", "n_intra", "n_cross", "lam_hat")
        exploded = tx_pdf.explode("accounts").rename(columns={"accounts": "account"})
        exploded["account"] = exploded["account"].astype("int64")
        sql = """
            WITH spans AS (
                SELECT e.tx_id, a.shard
                FROM acc e JOIN alloc a USING (account)
                GROUP BY e.tx_id, a.shard
            ),
            mus AS (
                SELECT tx_id, COUNT(*) AS mu FROM spans GROUP BY tx_id
            )
            SELECT s.shard,
                   SUM(CASE WHEN m.mu = 1 THEN 1 ELSE 0 END) AS n_intra,
                   SUM(CASE WHEN m.mu > 1 THEN 1 ELSE 0 END) AS n_cross,
                   SUM(1.0 / m.mu) AS lam_hat
            FROM spans s JOIN mus m USING (tx_id)
            GROUP BY s.shard
        """
        assert_equivalent(got, sql, acc=exploded[["tx_id", "account"]], alloc=alloc)

    def test_gamma_vs_duckdb(self, spark, tx_df, tx_pdf, adj):
        labels = hash_alloc(adj.nodes, 6)
        alloc = pd.DataFrame({"account": adj.nodes, "shard": labels})
        alloc_df = spark.createDataFrame(alloc)
        mu_df = tx_mu(tx_df, alloc_df)
        got_gamma = mu_df.filter(F.col("mu") > 1).count() / tx_df.count()
        exploded = tx_pdf.explode("accounts").rename(columns={"accounts": "account"})
        exploded["account"] = exploded["account"].astype("int64")
        import duckdb

        con = duckdb.connect()
        con.register("acc", exploded[["tx_id", "account"]])
        con.register("alloc", alloc)
        want = con.execute(
            """
            WITH mus AS (
              SELECT e.tx_id, COUNT(DISTINCT a.shard) AS mu
              FROM acc e JOIN alloc a USING (account) GROUP BY e.tx_id
            )
            SELECT SUM(CASE WHEN mu > 1 THEN 1 ELSE 0 END) * 1.0 / COUNT(*) FROM mus
            """
        ).fetchone()[0]
        con.close()
        assert got_gamma == pytest.approx(want)
