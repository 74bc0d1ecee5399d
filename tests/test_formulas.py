"""Unit tests for the scalar metric formulas (paper §III-B, Eqs. 1-4)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.metrics.formulas import clip_throughput, latency_zeta, rho, worst_latency


class TestRho:
    def test_uniform_is_zero(self):
        assert rho(np.full(7, 13.0)) == 0.0

    def test_single_shard(self):
        assert rho(np.array([5.0])) == 0.0

    @pytest.mark.parametrize(
        "sigmas,expected",
        [
            ([0.0, 2.0], 1.0),
            ([1.0, 3.0, 5.0], np.sqrt(8.0 / 3.0)),
            ([10.0, 10.0, 10.0, 22.0], np.sqrt(27.0)),
        ],
    )
    def test_hand_cases(self, sigmas, expected):
        assert rho(np.array(sigmas)) == pytest.approx(expected)

    def test_population_not_sample_stddev(self):
        # Eq. (1) divides by k, not k-1.
        s = np.array([0.0, 1.0])
        assert rho(s) == pytest.approx(0.5)

    @given(st.lists(st.floats(0, 1e6), min_size=1, max_size=50))
    @settings(max_examples=50, deadline=None)
    def test_matches_numpy(self, xs):
        assert rho(np.array(xs)) == pytest.approx(float(np.std(xs)), abs=1e-6)


class TestClipThroughput:
    def test_under_capacity_passthrough(self):
        out = clip_throughput(np.array([5.0]), np.array([4.0]), lam=10.0)
        assert out[0] == 4.0

    def test_at_capacity_passthrough(self):
        out = clip_throughput(np.array([10.0]), np.array([7.0]), lam=10.0)
        assert out[0] == 7.0

    def test_over_capacity_scaled(self):
        # Eq. (3): lambda/sigma * lam_hat
        out = clip_throughput(np.array([20.0]), np.array([8.0]), lam=10.0)
        assert out[0] == pytest.approx(4.0)

    def test_empty_shard_zero(self):
        out = clip_throughput(np.array([0.0]), np.array([0.0]), lam=10.0)
        assert out[0] == 0.0

    def test_vectorized_mixed(self):
        sig = np.array([0.0, 5.0, 30.0])
        lh = np.array([0.0, 5.0, 15.0])
        out = clip_throughput(sig, lh, lam=10.0)
        np.testing.assert_allclose(out, [0.0, 5.0, 5.0])

    @given(
        st.floats(0.01, 1e5),
        st.floats(0.0, 1e5),
        st.floats(0.01, 1e5),
    )
    @settings(max_examples=100, deadline=None)
    def test_never_exceeds_lam_hat(self, sigma, lam_hat, lam):
        out = float(clip_throughput(np.array([sigma]), np.array([lam_hat]), lam)[0])
        assert out <= lam_hat + 1e-9


class TestLatencyZeta:
    @pytest.mark.parametrize("sig", [0.1, 0.5, 0.999, 1.0])
    def test_under_capacity_is_one(self, sig):
        assert float(latency_zeta(np.array([sig]), lam=1.0)[0]) == pytest.approx(1.0)

    def test_empty_shard_is_one(self):
        assert float(latency_zeta(np.array([0.0]), lam=1.0)[0]) == 1.0

    @pytest.mark.parametrize(
        "s_hat,expected",
        [
            (1.5, 4.0 / 3.0),  # paper's own non-integer form
            (2.0, 1.5),        # exact antiderivative at integers
            (2.5, (3.0 + 0.5 * 3.0) / 2.5),
            (3.0, 2.0),        # (1+2+3)/3
            (4.0, 2.5),
        ],
    )
    def test_hand_cases(self, s_hat, expected):
        assert float(latency_zeta(np.array([s_hat]), lam=1.0)[0]) == pytest.approx(expected)

    def test_scale_invariance_in_lam(self):
        a = float(latency_zeta(np.array([30.0]), lam=10.0)[0])
        b = float(latency_zeta(np.array([3.0]), lam=1.0)[0])
        assert a == pytest.approx(b)

    @given(st.floats(0.01, 50.0))
    @settings(max_examples=100, deadline=None)
    def test_matches_numeric_integral(self, s_hat):
        # zeta = mean of ceil(x) over (0, s_hat] — compare to a Riemann sum.
        xs = np.linspace(1e-9, s_hat, 20001)
        numeric = float(np.mean(np.ceil(xs)))
        got = float(latency_zeta(np.array([s_hat]), lam=1.0)[0])
        assert got == pytest.approx(numeric, rel=1e-2)

    @given(st.floats(0.01, 100.0))
    @settings(max_examples=100, deadline=None)
    def test_bounds(self, s_hat):
        z = float(latency_zeta(np.array([s_hat]), lam=1.0)[0])
        assert 1.0 <= z <= np.ceil(s_hat)

    def test_monotone_in_workload(self):
        sig = np.linspace(0.1, 20, 200)
        z = latency_zeta(sig, lam=1.0)
        assert (np.diff(z) >= -1e-12).all()


class TestWorstLatency:
    @pytest.mark.parametrize(
        "sigmas,lam,expected",
        [
            ([0.5, 0.9], 1.0, 1.0),
            ([1.0, 2.0], 1.0, 2.0),
            ([2.1], 1.0, 3.0),
            ([5.0, 50.0, 7.0], 10.0, 5.0),
            ([], 1.0, 1.0),
        ],
    )
    def test_hand_cases(self, sigmas, lam, expected):
        assert worst_latency(np.array(sigmas), lam) == expected
