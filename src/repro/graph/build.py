"""Transaction graph construction (paper §III-C, Definition 2) in Spark.

A transaction touching the account set ``A_Tx`` becomes ``π = C(|A_Tx|, 2)``
one-to-one edges, each of weight ``1/π``, so the transaction's total edge
weight is exactly 1. A transaction with a single account (``|A_Tx| = 1``,
e.g. an Ethereum self-transfer used to cancel a pending tx) becomes a
self-loop of weight 1. Edges are undirected and stored canonically with
``src <= dst``; parallel edges are summed (Def. 2's ``w_{v,u}``).
"""
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def tx_accounts(tx_df: DataFrame) -> DataFrame:
    """Explode ``(tx_id, accounts)`` into ``(tx_id, pos, account)`` rows.

    ``accounts`` is assumed deduplicated; this defensively re-applies
    ``array_distinct``/``array_sort`` so the pair join below cannot emit a
    spurious self-pair, then keeps the per-tx account count ``n_acct``.
    """
    canon = tx_df.withColumn("accounts", F.array_sort(F.array_distinct("accounts")))
    return canon.select(
        "tx_id",
        F.size("accounts").alias("n_acct"),
        F.posexplode("accounts").alias("pos", "account"),
    )


def build_tx_graph(tx_df: DataFrame) -> DataFrame:
    """Build the aggregated weighted edge DataFrame ``(src, dst, weight)``.

    ``src <= dst`` always; ``src == dst`` rows are self-loops. The sum of
    all weights equals the number of transactions (each tx contributes 1).
    Implementation: a position self-join on the exploded accounts produces
    the ``C(n, 2)`` unordered pairs per transaction (accounts are sorted,
    so ``pos_a < pos_b`` implies ``account_a < account_b``).
    """
    acc = tx_accounts(tx_df)
    a = acc.alias("a")
    b = acc.alias("b")
    pairs = (
        a.join(b, on=[F.col("a.tx_id") == F.col("b.tx_id"), F.col("a.pos") < F.col("b.pos")])
        .select(
            F.col("a.account").alias("src"),
            F.col("b.account").alias("dst"),
            # pi(Tx) = n*(n-1)/2; weight share = 1/pi
            (F.lit(2.0) / (F.col("a.n_acct") * (F.col("a.n_acct") - F.lit(1)))).alias("weight"),
        )
    )
    self_loops = (
        acc.filter(F.col("n_acct") == 1)
        .select(
            F.col("account").alias("src"),
            F.col("account").alias("dst"),
            F.lit(1.0).alias("weight"),
        )
    )
    return (
        pairs.unionByName(self_loops)
        .groupBy("src", "dst")
        .agg(F.sum("weight").alias("weight"))
    )
