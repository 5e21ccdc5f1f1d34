"""Tests for input/output sampling."""
import numpy as np
import pytest

from repro.core.sampling import draw_samples
from repro.synth_data import pareto_points

from tests.helpers import brute_force_count


@pytest.fixture(scope="module")
def data():
    return pareto_points(4000, 1.5, 2, seed=1), pareto_points(4000, 1.5, 2, seed=2)


class TestDrawSamples:
    def test_sizes_capped(self, data):
        S, T = data
        sm = draw_samples(S, T, np.array([10.0, 10.0]), k_input=512, seed=0)
        assert len(sm.s_pts) == 512 and len(sm.t_pts) == 512

    def test_full_sample_when_small_input(self, data):
        S, T = data
        sm = draw_samples(S[:100], T[:50], np.array([10.0, 10.0]), k_input=512, seed=0)
        assert len(sm.s_pts) == 100 and len(sm.t_pts) == 50
        assert sm.sw_s == 1.0 and sm.sw_t == 1.0

    def test_weights(self, data):
        S, T = data
        sm = draw_samples(S, T, np.array([10.0, 10.0]), k_input=1000, seed=0)
        assert sm.sw_s == pytest.approx(4.0)
        assert sm.n_s == sm.n_t == 4000

    def test_deterministic(self, data):
        S, T = data
        a = draw_samples(S, T, np.array([10.0, 10.0]), seed=7)
        b = draw_samples(S, T, np.array([10.0, 10.0]), seed=7)
        assert (a.s_pts == b.s_pts).all() and (a.o_s == b.o_s).all()

    def test_seed_changes_sample(self, data):
        S, T = data
        a = draw_samples(S, T, np.array([10.0, 10.0]), k_input=512, seed=1)
        b = draw_samples(S, T, np.array([10.0, 10.0]), k_input=512, seed=2)
        assert (a.s_pts != b.s_pts).any()

    def test_output_estimate_unbiased(self, data):
        S, T = data
        eps = np.array([30.0, 30.0])
        true_out = brute_force_count(S, T, eps)
        ests = [
            draw_samples(S, T, eps, k_output_base=2000, seed=s).o_total_est
            for s in range(8)
        ]
        mean = float(np.mean(ests))
        assert 0.5 * true_out <= mean <= 1.7 * true_out

    def test_full_output_sample_exact(self, data):
        S, T = data
        eps = np.array([30.0, 30.0])
        sm = draw_samples(S, T, eps, k_output_base=10_000, seed=0)
        # sub-sample == full input -> output sample is the exact join
        assert sm.sw_o == 1.0
        assert sm.o_total_est == brute_force_count(S, T, eps)

    def test_output_pairs_satisfy_band(self, data):
        S, T = data
        eps = np.array([20.0, 20.0])
        sm = draw_samples(S, T, eps, seed=0)
        assert (np.abs(sm.o_s - sm.o_t) <= eps).all()

    def test_thinning(self, data):
        S, T = data
        eps = np.array([200.0, 200.0])
        sm = draw_samples(S, T, eps, k_output_base=3000, max_output_pairs=500, seed=0)
        assert len(sm.o_s) == 500
        # weight adjusted so the total estimate is preserved
        assert sm.o_total_est > 500

    def test_empty_output(self, data):
        S, T = data
        sm = draw_samples(S, T + 1e9, np.array([1.0, 1.0]), seed=0)
        assert len(sm.o_s) == 0 and sm.o_total_est == 0
