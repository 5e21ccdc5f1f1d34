"""Tests for the CS_IO quantile-stripe rectangle-covering baseline."""
import numpy as np
import pytest

from repro.baselines.csio import build_csio
from repro.core.cost_model import CostModel
from repro.dist.metrics import evaluate_partitioning
from repro.synth_data import pareto_points, rv_pareto_points

from tests.helpers import assert_partitioning_correct


class TestCorrectness:
    @pytest.mark.parametrize("d,eps_val", [(1, 0.0), (1, 30.0), (2, 50.0), (3, 60.0)])
    def test_exact_result(self, d, eps_val):
        S = pareto_points(800, 1.5, d, seed=1)
        T = pareto_points(800, 1.5, d, seed=2)
        eps = np.full(d, eps_val)
        part = build_csio(S, T, eps, w=8, seed=0)
        assert_partitioning_correct(part, S, T, eps)

    def test_disjoint_ranges_zero_output(self):
        # rv-pareto-style gap: no stripe pair is relevant -> sink tasks
        S = rv_pareto_points(500, 1.5, 1, seed=3, side="S")
        T = rv_pareto_points(500, 1.5, 1, seed=4, side="T")
        eps = np.array([10.0])
        part = build_csio(S, T, eps, w=4, seed=0)
        assert_partitioning_correct(part, S, T, eps)

    def test_skewed_duplicated_quantiles(self):
        # heavy hitters collapse quantile boundaries; must stay correct
        S = np.vstack([np.full((700, 1), 7.0), pareto_points(100, 1.5, 1, seed=5)])
        T = np.vstack([np.full((700, 1), 7.0), pareto_points(100, 1.5, 1, seed=6)])
        eps = np.array([0.5])
        part = build_csio(S, T, eps, w=6, seed=0)
        assert_partitioning_correct(part, S, T, eps)


class TestStructure:
    def test_every_tuple_assigned(self):
        S = pareto_points(1000, 1.5, 1, seed=7)
        T = pareto_points(1000, 1.5, 1, seed=8)
        part = build_csio(S, T, np.array([5.0]), w=8, seed=0)
        si, _ = part.assign(S, "S")
        ti, _ = part.assign(T, "T")
        assert len(np.unique(si)) == len(S)   # Definition 1 coverage
        assert len(np.unique(ti)) == len(T)

    def test_rect_count_at_most_w_plus_sinks(self):
        S = pareto_points(2000, 1.5, 1, seed=9)
        T = pareto_points(2000, 1.5, 1, seed=10)
        w = 8
        part = build_csio(S, T, np.array([5.0]), w=w, seed=0)
        assert part.n_tasks <= 2 * w  # <= w rects + <= w sinks

    def test_granularity_increases_opt_cost(self):
        import time

        S = pareto_points(4000, 1.5, 1, seed=11)
        T = pareto_points(4000, 1.5, 1, seed=12)
        eps = np.array([5.0])
        t0 = time.perf_counter()
        build_csio(S, T, eps, w=8, g=16, seed=0)
        coarse = time.perf_counter() - t0
        t0 = time.perf_counter()
        build_csio(S, T, eps, w=8, g=256, seed=0)
        fine = time.perf_counter() - t0
        assert fine > coarse

    def test_io_awareness_beats_naive_quantiles(self):
        """CS_IO's covering should duplicate far less than the sqrt(w)
        1-Bucket cover on a 1D band-join (paper Table 2a shape)."""
        S = pareto_points(5000, 1.5, 1, seed=13)
        T = pareto_points(5000, 1.5, 1, seed=14)
        eps = np.array([0.5])
        part = build_csio(S, T, eps, w=30, seed=0)
        ev = evaluate_partitioning(part, S, T, eps)
        assert ev.dup_overhead < 1.0  # 1-Bucket would be 4.5

    def test_custom_cost_model(self):
        S = pareto_points(1000, 1.5, 1, seed=15)
        T = pareto_points(1000, 1.5, 1, seed=16)
        part = build_csio(
            S, T, np.array([2.0]), w=4, cost_model=CostModel().with_ratio(10), seed=0
        )
        assert_partitioning_correct(part, S, T, np.array([2.0]))
