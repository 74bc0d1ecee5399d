"""Scalar metric formulas from paper §III-B.

All functions are numpy-vectorized over shards and used by both the Spark
and pandas evaluators, the graph-level optimizer state, and the latency
tables.
"""
from __future__ import annotations

import numpy as np


def rho(sigmas: np.ndarray) -> float:
    """Workload balance: population standard deviation of σ_i (Eq. 1)."""
    s = np.asarray(sigmas, dtype=np.float64)
    return float(np.sqrt(np.mean((s - s.mean()) ** 2)))


def clip_throughput(sigma, lam_hat, lam: float):
    """Per-shard throughput Λ_i under capacity λ (Eq. 3).

    ``Λ_i = Λ̂_i`` when σ_i ≤ λ, else ``(λ/σ_i)·Λ̂_i`` (transactions are
    processed chronologically, so an overloaded shard completes only the
    fraction λ/σ_i of its workload). Shards with σ_i = 0 contribute 0.
    """
    sigma = np.asarray(sigma, dtype=np.float64)
    lam_hat = np.asarray(lam_hat, dtype=np.float64)
    safe = np.where(sigma > 0, sigma, 1.0)
    return np.where(sigma <= lam, lam_hat, lam / safe * lam_hat)


def latency_zeta(sigma, lam: float):
    """Average confirmation latency ζ_i in time units (Eq. 4).

    With normalized workload σ̂ = σ/λ this is the mean of the staircase
    ``⌈x⌉`` over (0, σ̂]: ``ζ = (⌊σ̂⌋(⌊σ̂⌋+1)/2 + (σ̂-⌊σ̂⌋)⌈σ̂⌉) / σ̂``.
    The paper writes the first term as ⌊σ̂⌋⌈σ̂⌉/2, identical for
    non-integer σ̂; at exact integers ⌈σ̂⌉ = ⌊σ̂⌋ and the paper's form
    under-counts the integral, so we use the exact antiderivative. Equals
    1 when σ̂ ≤ 1 (all txs confirm in one block). Empty shards (σ = 0)
    are reported as latency 1.
    """
    sigma = np.asarray(sigma, dtype=np.float64)
    s_hat = sigma / lam
    s_safe = np.where(s_hat > 0, s_hat, 1.0)
    fl = np.floor(s_safe)
    ce = np.ceil(s_safe)
    z = (fl * (fl + 1.0) / 2.0 + (s_safe - fl) * ce) / s_safe
    return np.where(s_hat > 0, z, 1.0)


def worst_latency(sigma, lam: float) -> float:
    """Worst-case latency: time units to drain the most loaded shard,
    ``max_i ⌈σ_i/λ⌉`` (Fig. 7 reports the most over-loaded shard)."""
    sigma = np.asarray(sigma, dtype=np.float64)
    if sigma.size == 0:
        return 1.0
    return float(max(1.0, np.ceil(sigma.max() / lam)))
