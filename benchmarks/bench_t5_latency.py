"""T5 bench (Figs. 6-7): the latency staircase formula over a large
vector of shard workloads."""
import numpy as np


def test_t5_latency_formula(benchmark):
    from repro.metrics.formulas import latency_zeta, worst_latency

    rng = np.random.default_rng(0)
    sigmas = rng.uniform(0, 5000, size=1_000_000)

    def run():
        z = latency_zeta(sigmas, lam=1000.0)
        return float(z.mean()), worst_latency(sigmas, 1000.0)

    avg, worst = benchmark(run)
    assert 1.0 <= avg <= worst
