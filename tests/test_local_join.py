"""Tests for the vectorized per-task local band-join."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.dist.local_join import band_join_count, band_join_pairs, band_join_tasks

from tests.helpers import brute_force_count, brute_force_pairs


def _rand(n, d, seed, spread=10.0):
    return np.random.default_rng(seed).random((n, d)) * spread


class TestSingleTask:
    @pytest.mark.parametrize("d", [1, 2, 3, 4])
    def test_count_matches_brute_force(self, d):
        S, T = _rand(300, d, 1), _rand(400, d, 2)
        eps = np.full(d, 0.5)
        assert band_join_count(S, T, eps) == brute_force_count(S, T, eps)

    def test_pairs_match_brute_force(self):
        S, T = _rand(200, 2, 3), _rand(200, 2, 4)
        eps = np.array([0.7, 0.7])
        ps, pt = band_join_pairs(S, T, eps)
        got = set(zip(ps.tolist(), pt.tolist()))
        want = set(map(tuple, brute_force_pairs(S, T, eps).tolist()))
        assert got == want

    def test_eps_zero_equi(self):
        vals = np.array([[1.0], [2.0], [2.0], [3.0]])
        assert band_join_count(vals, vals, np.array([0.0])) == 1 + 4 + 1

    def test_boundary_exactly_eps_included(self):
        S = np.array([[0.0]])
        T = np.array([[0.5], [0.5000001], [-0.5]])
        assert band_join_count(S, T, np.array([0.5])) == 2

    def test_empty_sides(self):
        S = np.empty((0, 2))
        T = _rand(10, 2, 5)
        assert band_join_count(S, T, np.array([1.0, 1.0])) == 0
        assert band_join_count(T, S, np.array([1.0, 1.0])) == 0

    def test_identical_points(self):
        S = np.zeros((5, 3))
        assert band_join_count(S, S, np.zeros(3)) == 25

    def test_degenerate_dim0_span(self):
        # all dim-0 values equal -> normalization span is 0
        S = np.column_stack([np.ones(50), _rand(50, 1, 6)[:, 0]])
        T = np.column_stack([np.ones(60), _rand(60, 1, 7)[:, 0]])
        eps = np.array([0.0, 1.0])
        assert band_join_count(S, T, eps) == brute_force_count(S, T, eps)

    def test_large_band_full_cross_product(self):
        S, T = _rand(40, 1, 8), _rand(50, 1, 9)
        assert band_join_count(S, T, np.array([100.0])) == 40 * 50


class TestMultiTask:
    def test_tasks_are_isolated(self):
        # same coordinates in different tasks must not join
        S = np.array([[1.0], [1.0]])
        T = np.array([[1.0], [1.0]])
        counts, total = band_join_tasks(
            np.array([0, 1]), S, np.array([1, 0]), T, np.array([0.5])
        )
        assert total == 2  # each S matches only the T in its own task
        assert counts.tolist() == [1, 1]

    def test_matches_per_task_brute_force(self):
        rng = np.random.default_rng(10)
        S, T = _rand(500, 2, 11), _rand(600, 2, 12)
        ts = rng.integers(0, 7, len(S))
        tt = rng.integers(0, 7, len(T))
        eps = np.array([0.8, 0.8])
        _, total = band_join_tasks(ts, S, tt, T, eps)
        want = sum(
            brute_force_count(S[ts == k], T[tt == k], eps) for k in range(7)
        )
        assert total == want

    def test_pairs_mode_consistent_with_counts(self):
        rng = np.random.default_rng(13)
        S, T = _rand(300, 1, 14), _rand(300, 1, 15)
        ts = rng.integers(0, 4, len(S))
        tt = rng.integers(0, 4, len(T))
        eps = np.array([0.3])
        counts, total = band_join_tasks(ts, S, tt, T, eps)
        ps, pt, total2 = band_join_tasks(ts, S, tt, T, eps, produce_pairs=True)
        assert total == total2 == len(ps) == counts.sum()
        # every produced pair shares a task and satisfies the band
        assert (ts[ps] == tt[pt]).all()
        assert (np.abs(S[ps, 0] - T[pt, 0]) <= eps[0]).all()

    def test_sparse_task_ids(self):
        # non-contiguous large task ids must still isolate correctly
        S = np.array([[5.0], [5.0]])
        T = np.array([[5.0], [5.0]])
        counts, total = band_join_tasks(
            np.array([1_000_000, 2_000_000]), S,
            np.array([2_000_000, 1_000_000]), T, np.array([1.0]),
        )
        assert total == 2

    def test_chunking_gives_same_result(self):
        S, T = _rand(400, 2, 16), _rand(400, 2, 17)
        ts = np.zeros(len(S), np.int64)
        tt = np.zeros(len(T), np.int64)
        eps = np.array([2.0, 2.0])
        _, a = band_join_tasks(ts, S, tt, T, eps, chunk_candidates=97)
        _, b = band_join_tasks(ts, S, tt, T, eps)
        assert a == b == brute_force_count(S, T, eps)


@settings(max_examples=25, deadline=None)
@given(
    data=st.data(),
    d=st.integers(min_value=1, max_value=3),
    eps_val=st.floats(min_value=0.0, max_value=2.0),
)
def test_property_count_equals_brute_force(data, d, eps_val):
    n_s = data.draw(st.integers(1, 40))
    n_t = data.draw(st.integers(1, 40))
    seed = data.draw(st.integers(0, 10_000))
    rng = np.random.default_rng(seed)
    # grid-snapped values exercise exact boundary equality |x-y| == eps
    S = np.round(rng.random((n_s, d)) * 8) / 2.0
    T = np.round(rng.random((n_t, d)) * 8) / 2.0
    eps = np.full(d, round(eps_val * 2) / 2.0)
    assert band_join_count(S, T, eps) == brute_force_count(S, T, eps)
