"""Tests for the partitioning base: LPT scheduling, id hashing, and
worker-level de-duplication."""
import numpy as np
import pytest

from repro.baselines.one_bucket import OneBucketPartitioning
from repro.dist.partitioning import hash_ids, lpt_schedule


class TestLpt:
    def test_empty(self):
        assert lpt_schedule(np.array([]), 4).tolist() == []

    def test_single_worker(self):
        assert set(lpt_schedule(np.array([1.0, 2.0, 3.0]), 1)) == {0}

    def test_balanced_on_equal_loads(self):
        tw = lpt_schedule(np.ones(12), 4)
        counts = np.bincount(tw, minlength=4)
        assert counts.tolist() == [3, 3, 3, 3]

    def test_within_4_3_of_optimum(self):
        # classical LPT guarantee: makespan <= (4/3 - 1/3w) * OPT
        rng = np.random.default_rng(0)
        loads = rng.random(50) * 10
        w = 5
        tw = lpt_schedule(loads, w)
        makespan = np.bincount(tw, weights=loads, minlength=w).max()
        opt_lb = max(loads.max(), loads.sum() / w)
        assert makespan <= (4 / 3) * opt_lb + 1e-9

    def test_all_workers_get_tasks_when_enough(self):
        tw = lpt_schedule(np.arange(1, 21, dtype=float), 6)
        assert len(set(tw.tolist())) == 6

    def test_heaviest_task_alone_when_dominant(self):
        loads = np.array([100.0, 1.0, 1.0, 1.0])
        tw = lpt_schedule(loads, 2)
        heavy_worker = tw[0]
        assert all(tw[i] != heavy_worker for i in (1, 2, 3))


class TestHashIds:
    def test_deterministic(self):
        ids = np.arange(1000, dtype=np.int64)
        a = hash_ids(ids, 7, 13)
        b = hash_ids(ids, 7, 13)
        assert (a == b).all()

    def test_range(self):
        out = hash_ids(np.arange(500, dtype=np.int64), 3, 7)
        assert out.min() >= 0 and out.max() < 7

    def test_seed_changes_assignment(self):
        ids = np.arange(1000, dtype=np.int64)
        assert (hash_ids(ids, 1, 16) != hash_ids(ids, 2, 16)).any()

    def test_roughly_uniform(self):
        out = hash_ids(np.arange(30_000, dtype=np.int64), 0, 10)
        counts = np.bincount(out, minlength=10)
        assert counts.min() > 2400 and counts.max() < 3600

    def test_consecutive_ids_decorrelated(self):
        out = hash_ids(np.arange(1000, dtype=np.int64), 0, 2)
        runs = np.abs(np.diff(out)).sum()  # ~half of steps should flip
        assert 350 < runs < 650

    def test_no_overflow_warning(self):
        with np.errstate(over="raise"):
            hash_ids(np.array([2**62], dtype=np.int64), 123456, 97)


class TestAssignWorkers:
    def test_dedupes_tasks_on_same_worker(self):
        # with w < r*c impossible for 1-Bucket (r*c <= w); craft via a
        # partitioning whose several tasks share a worker
        part = OneBucketPartitioning(100, 100, 6, seed=0)  # r=2, c=3
        part.task_to_worker = np.zeros(part.n_tasks, dtype=np.int64)
        pts = np.zeros((10, 1))
        idx, workers = part.assign_workers(pts, "S", ids=np.arange(10))
        # each S tuple goes to c=3 tasks, all on worker 0 -> one shipment
        assert len(idx) == 10
        assert set(workers.tolist()) == {0}

    def test_no_dedupe_across_workers(self):
        part = OneBucketPartitioning(100, 100, 6, seed=0)
        pts = np.zeros((10, 1))
        idx, workers = part.assign_workers(pts, "S", ids=np.arange(10))
        assert len(idx) == 10 * part.c  # distinct workers per task here
