"""Pandas mirror of :mod:`repro.graph.build`.

The adaptive simulation (paper Figs. 9-10) rebuilds the transaction graph
every time step over small per-step slices; launching a Spark job per step
would dominate the measured A-TxAllo run time, so the incremental path
uses this mirror. ``tests/test_graph_build.py`` pins it row-for-row to the
Spark builder.
"""
from itertools import combinations

import numpy as np
import pandas as pd


def build_tx_graph_pandas(tx_pdf: pd.DataFrame) -> pd.DataFrame:
    """Aggregated weighted edges ``(src, dst, weight)`` with ``src <= dst``.

    Same contract as :func:`repro.graph.build.build_tx_graph`: a tx with
    ``n`` distinct accounts yields ``C(n,2)`` pairs of weight ``2/(n(n-1))``
    each; single-account txs yield a weight-1 self-loop.
    """
    srcs: list[int] = []
    dsts: list[int] = []
    ws: list[float] = []
    for accounts in tx_pdf["accounts"]:
        acc = sorted(set(accounts))
        n = len(acc)
        if n == 1:
            srcs.append(acc[0])
            dsts.append(acc[0])
            ws.append(1.0)
            continue
        w = 2.0 / (n * (n - 1))
        for u, v in combinations(acc, 2):
            srcs.append(u)
            dsts.append(v)
            ws.append(w)
    edges = pd.DataFrame(
        {
            "src": np.asarray(srcs, dtype=np.int64),
            "dst": np.asarray(dsts, dtype=np.int64),
            "weight": np.asarray(ws, dtype=np.float64),
        }
    )
    return (
        edges.groupby(["src", "dst"], as_index=False, sort=True)["weight"].sum()
    )
