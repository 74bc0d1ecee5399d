"""Shard Scheduler — transaction-level streaming allocator (Król et al.).

The paper's transaction-level baseline (§II-C, §VI-B): instead of a
global graph partition, accounts are placed (and may migrate) as each
transaction arrives, chronologically. Our deterministic distillation
keeps the properties the paper's comparison relies on:

- **hard load cap** (buffer ratio × λ, buffer = 1 per §VI-B1): a shard
  whose accumulated load reached the cap receives no placements, and
  resident accounts drain out of it over time, so the workload
  distribution is essentially flat with no overloaded shard (paper
  Figs. 3 and 4c) and the worst-case latency is the best of all methods
  (Fig. 7);
- **affinity placement, one migration per transaction**: new accounts
  are pulled toward the shard already holding most of the transaction's
  accounts (or the least-loaded shard when that one is full). Because
  moving account *state* across shards is expensive, at most one
  existing account migrates per transaction — the first one stuck in a
  full shard. Busy account groups therefore split when their shard
  fills and re-align only gradually, which is why Shard Scheduler's γ
  sits above the graph-based methods (but well below random);
- **streaming accounting**: a transaction's shard span μ and workload
  charges are those at processing time (a transaction-level allocator
  assigns transactions, not a retroactive final map);
- **per-transaction processing**: running time scales with the number
  of transactions, making it by far the slowest method (Fig. 8).

The full Shard Scheduler objective (sender/receiver roles, explicit
migration cost model) is simplified to affinity + per-block least-load;
DESIGN.md documents this substitution.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd


@dataclass(frozen=True)
class SchedulerResult:
    """Final mapping + the *streaming* per-shard statistics."""

    shard_of: dict[int, int]
    n_txs: int
    n_cross_total: int  # txs that spanned >1 shard when processed
    n_intra: np.ndarray  # per-shard intra-tx count (len k)
    n_cross: np.ndarray  # per-shard cross-tx count (len k)
    lam_hat: np.ndarray  # per-shard Σ 1/μ (len k)

    def stats(self) -> tuple[int, int, pd.DataFrame]:
        """The same triple as ``repro.metrics.blockchain.collect_stats``."""
        k = len(self.n_intra)
        frame = pd.DataFrame(
            {
                "shard": np.arange(k),
                "n_intra": self.n_intra,
                "n_cross": self.n_cross,
                "lam_hat": self.lam_hat,
            }
        )
        return self.n_txs, self.n_cross_total, frame


def shard_scheduler(
    tx_pdf: pd.DataFrame,
    k: int,
    *,
    eta: float,
    lam: float,
    buffer_ratio: float = 1.0,
) -> SchedulerResult:
    """Stream transactions in ``tx_id`` order.

    ``lam`` is the per-shard capacity over the full window (λ = |T|/k in
    the paper's setting); the placement cap is ``buffer_ratio·λ``.
    Deterministic.
    """
    cap = buffer_ratio * lam
    order = np.argsort(tx_pdf["tx_id"].to_numpy(), kind="stable")
    accounts_col = tx_pdf["accounts"].to_numpy(object)

    shard_of: dict[int, int] = {}
    load = [0.0] * k
    n_intra = np.zeros(k, dtype=np.float64)
    n_cross = np.zeros(k, dtype=np.float64)
    lam_hat = np.zeros(k, dtype=np.float64)
    n_cross_total = 0

    def best_shard(counts: dict[int, int]) -> int:
        """Shard Scheduler's placement objective, evaluated over every
        candidate shard: the under-cap shard with the highest affinity
        (most involved accounts already there; ties by lower load, then
        lower id), falling back to the least-loaded shard overall. This
        O(k) per-object scan, run for every transaction of the stream,
        is what makes transaction-level allocation expensive at chain
        scale (paper Fig. 8)."""
        best_aff = None
        best_aff_key = None
        least = 0
        least_load = load[0]
        for s in range(k):
            ls = load[s]
            if ls < least_load:
                least, least_load = s, ls
            aff = counts.get(s, 0)
            if aff > 0 and ls < cap:
                key = (-aff, ls, s)
                if best_aff is None or key < best_aff_key:
                    best_aff, best_aff_key = s, key
        return least if best_aff is None else best_aff

    for i in order:
        accounts = [int(a) for a in accounts_col[i]]
        counts: dict[int, int] = {}
        for a in accounts:
            s = shard_of.get(a)
            if s is not None:
                counts[s] = counts.get(s, 0) + 1

        # The objective is evaluated for every transaction (its target
        # shard drives both placement of new accounts and migration).
        target = best_shard(counts)
        migrated = False
        for a in accounts:
            s = shard_of.get(a)
            if s is None:
                shard_of[a] = target
            elif s != target and load[s] >= cap and not migrated:
                # One state migration per transaction: the first account
                # stuck in a full shard moves with the transaction.
                shard_of[a] = target
                migrated = True

        shards = {shard_of[a] for a in accounts}
        mu = len(shards)
        w = 1.0 if mu == 1 else eta
        for s in shards:
            load[s] += w
            lam_hat[s] += 1.0 / mu
            if mu == 1:
                n_intra[s] += 1
            else:
                n_cross[s] += 1
        if mu > 1:
            n_cross_total += 1
    return SchedulerResult(
        shard_of=shard_of,
        n_txs=len(order),
        n_cross_total=n_cross_total,
        n_intra=n_intra,
        n_cross=n_cross,
        lam_hat=lam_hat,
    )
