"""The join-partitioning abstraction shared by RecPart and all baselines.

A :class:`Partitioning` materializes the paper's assignment function
``h : S ∪ T → 2^{1..w} \\ {}`` (Definition 1), factored through *tasks*:

* ``assign(points, side, ids)`` maps each input tuple to one or more
  **task** ids. A task is the unit of local-join work: a split-tree leaf
  (or one 1-Bucket cell inside a small leaf) for RecPart, a grid cell for
  Grid-eps, a matrix cell for 1-Bucket, a cover rectangle for CS_IO, a
  joinable block pair for IEJoin.
* ``task_to_worker`` maps tasks to the w workers (our stand-in for the
  paper's YARN scheduler: greedy LPT by estimated load, or hashing for
  the fine-grained grid).

Correctness contract (tested property): for every joining pair
``(s, t)`` there is **exactly one** task that receives both tuples, so
each output row is produced once and no post-hoc dedup is needed.
"""
from __future__ import annotations

import abc

import numpy as np

Assignment = tuple[np.ndarray, np.ndarray]  # (row index into points, task id)


class Partitioning(abc.ABC):
    """Assignment of tuples to tasks plus a task->worker schedule."""

    #: total number of tasks (contiguous ids 0..n_tasks-1)
    n_tasks: int
    #: int array of shape (n_tasks,) with values in [0, w)
    task_to_worker: np.ndarray
    #: number of workers
    w: int

    @abc.abstractmethod
    def assign(
        self, points: np.ndarray, side: str, ids: np.ndarray | None = None
    ) -> Assignment:
        """Map tuples to tasks.

        ``points``: float array (n, d) of join-attribute values.
        ``side``: ``'S'`` or ``'T'``.
        ``ids``: optional int64 tuple ids; required by partitionings that
        use per-tuple randomized assignment (1-Bucket rows/columns) so the
        choice is deterministic and consistent across Spark executors.

        Returns ``(idx, task)`` in COO form: tuple ``points[idx[k]]`` is
        sent to ``task[k]``. A tuple may appear multiple times (input
        duplication) but never twice with the same task.
        """

    def assign_workers(
        self, points: np.ndarray, side: str, ids: np.ndarray | None = None
    ) -> Assignment:
        """Like :meth:`assign` but mapped to workers and de-duplicated, so
        it realizes ``h`` directly: tuple k is shipped once to each worker
        in ``h(k)`` even when several of its tasks share a worker."""
        idx, task = self.assign(points, side, ids)
        worker = self.task_to_worker[task]
        key = idx.astype(np.int64) * self.w + worker
        uniq = np.unique(key)
        return (uniq // self.w).astype(np.int64), (uniq % self.w).astype(np.int64)


def lpt_schedule(task_loads: np.ndarray, w: int) -> np.ndarray:
    """Greedy longest-processing-time assignment of tasks to w workers.

    Sort tasks by load descending, always give the next task to the
    currently least-loaded worker. Returns task->worker map.
    """
    import heapq

    n = len(task_loads)
    out = np.zeros(n, dtype=np.int64)
    if n == 0:
        return out
    heap = [(0.0, i) for i in range(w)]
    heapq.heapify(heap)
    for t in np.argsort(-np.asarray(task_loads, dtype=float)):
        load, wk = heapq.heappop(heap)
        out[t] = wk
        heapq.heappush(heap, (load + float(task_loads[t]), wk))
    return out


def hash_ids(ids: np.ndarray, seed: int, mod: int) -> np.ndarray:
    """Deterministic pseudo-random bucket in [0, mod) per tuple id.

    SplitMix64-style mix so consecutive ids land in unrelated buckets;
    used for 1-Bucket row/column choices (paper: uniform random
    assignment) while staying reproducible across processes.
    """
    mixed_seed = np.uint64((seed * 0x9E3779B97F4A7C15) & 0xFFFFFFFFFFFFFFFF)
    x = ids.astype(np.uint64) + mixed_seed
    x = (x ^ (x >> np.uint64(30))) * np.uint64(0xBF58476D1CE4E5B9)
    x = (x ^ (x >> np.uint64(27))) * np.uint64(0x94D049BB133111EB)
    x = x ^ (x >> np.uint64(31))
    return (x % np.uint64(mod)).astype(np.int64)
