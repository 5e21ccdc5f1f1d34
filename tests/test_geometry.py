"""Unit tests for the hyper-rectangle primitives."""
import numpy as np
import pytest

from repro.core.geometry import Rect


@pytest.fixture
def unit3() -> Rect:
    return Rect(np.zeros(3), np.ones(3))


class TestBounding:
    def test_contains_all_points(self):
        pts = np.random.default_rng(0).random((100, 2)) * 10
        r = Rect.bounding(pts)
        assert r.contains(pts).all()

    def test_multiple_sets(self):
        a = np.array([[0.0, 0.0]])
        b = np.array([[5.0, -3.0]])
        r = Rect.bounding(a, b)
        assert r.contains(a).all() and r.contains(b).all()

    def test_max_point_strictly_inside(self):
        pts = np.array([[1.0], [7.0]])
        r = Rect.bounding(pts)
        assert r.hi[0] > 7.0

    def test_skips_empty_sets(self):
        pts = np.array([[1.0, 2.0]])
        r = Rect.bounding(np.empty((0, 2)), pts)
        assert r.contains(pts).all()


class TestContains:
    def test_half_open(self, unit3):
        assert unit3.contains(np.zeros((1, 3))).all()       # lo inclusive
        assert not unit3.contains(np.ones((1, 3))).any()    # hi exclusive

    def test_outside(self, unit3):
        assert not unit3.contains(np.array([[0.5, 0.5, 1.5]])).any()

    def test_inside(self, unit3):
        assert unit3.contains(np.array([[0.5, 0.2, 0.9]])).all()


class TestEpsIntersection:
    def test_point_inside_always_intersects(self, unit3):
        p = np.array([[0.5, 0.5, 0.5]])
        assert unit3.intersects_eps_range(p, np.zeros(3)).all()

    def test_point_within_eps_outside(self, unit3):
        p = np.array([[1.05, 0.5, 0.5]])
        assert unit3.intersects_eps_range(p, np.full(3, 0.1)).all()
        assert not unit3.intersects_eps_range(p, np.full(3, 0.01)).any()

    def test_closed_at_lo(self, unit3):
        # eps-range [p-e, p+e] touching lo exactly intersects [lo, hi)
        p = np.array([[-0.1, 0.5, 0.5]])
        assert unit3.intersects_eps_range(p, np.array([0.1, 0.0, 0.0])).all()

    def test_open_at_hi(self, unit3):
        # p - eps == hi does not intersect the half-open box
        p = np.array([[1.1, 0.5, 0.5]])
        assert not unit3.intersects_eps_range(p, np.array([0.1, 0.0, 0.0])).any()

    def test_all_dims_must_intersect(self, unit3):
        p = np.array([[0.5, 0.5, 2.0]])
        assert not unit3.intersects_eps_range(p, np.full(3, 0.1)).any()


class TestSplit:
    def test_partitions_exactly(self, unit3):
        left, right = unit3.split(1, 0.4)
        pts = np.random.default_rng(1).random((200, 3))
        in_l = left.contains(pts)
        in_r = right.contains(pts)
        assert (in_l ^ in_r).all()

    def test_boundary_goes_right(self, unit3):
        left, right = unit3.split(0, 0.5)
        p = np.array([[0.5, 0.1, 0.1]])
        assert right.contains(p).all() and not left.contains(p).any()

    @pytest.mark.parametrize("value", [0.0, 1.0, -1.0, 2.0])
    def test_rejects_value_outside(self, unit3, value):
        with pytest.raises(ValueError):
            unit3.split(0, value)


class TestSmall:
    def test_small_when_sides_below_2eps(self):
        r = Rect(np.zeros(2), np.array([1.0, 1.0]))
        assert r.is_small(np.array([0.6, 0.6]))
        assert not r.is_small(np.array([0.4, 0.6]))

    def test_zero_eps_never_small(self):
        r = Rect(np.zeros(2), np.array([1e-12, 1e-12]))
        assert not r.is_small(np.zeros(2))
        assert not r.small_dims(np.zeros(2)).any()

    def test_small_dims_per_dimension(self):
        r = Rect(np.zeros(3), np.array([1.0, 10.0, 1.0]))
        sd = r.small_dims(np.array([0.6, 0.6, 0.0]))
        assert sd.tolist() == [True, False, False]

    def test_sides(self):
        r = Rect(np.array([1.0, 2.0]), np.array([4.0, 10.0]))
        assert r.sides.tolist() == [3.0, 8.0]
        assert r.d == 2
