"""Distributed IEJoin partitioning (Khayyat et al., VLDBJ 2017; paper §6.6/A.1).

Distributed IEJoin sorts each input on one join attribute (A_1) and
range-partitions it into blocks of ``sizePerBlock`` rows using
approximate quantiles. Every pair of *joinable* blocks — blocks whose
A_1-intervals are within the band width — becomes a task assigned to one
of the w workers; a block is shipped to every worker that owns at least
one of its pairs. This is the "direct quantile partitioning" the paper
contrasts with covering-based methods: block boundaries cut through
dense regions and blocks belonging to many joinable pairs are duplicated
to many workers, so input duplication is high and quite sensitive to the
sizePerBlock meta-parameter (paper Tables 7/11).

Local joins run per block pair, so each output pair is produced exactly
once (its (S-block, T-block) pair is a single task).
"""
from __future__ import annotations

import numpy as np

from ..core.sampling import Samples, draw_samples
from ..dist.partitioning import Partitioning, lpt_schedule


class IEJoinPartitioning(Partitioning):
    def __init__(
        self,
        S_pts: np.ndarray,
        T_pts: np.ndarray,
        eps,
        w: int,
        size_per_block: int,
        beta2: float = 4.0,
        beta3: float = 1.0,
        samples: Samples | None = None,
        seed: int = 0,
    ):
        eps = np.asarray(eps, dtype=float)
        self.w = int(w)
        n_s, n_t = len(S_pts), len(T_pts)
        if samples is None:
            samples = draw_samples(
                np.asarray(S_pts, float), np.asarray(T_pts, float), eps, seed=seed
            )
        nb_s = max(1, int(np.ceil(n_s / size_per_block)))
        nb_t = max(1, int(np.ceil(n_t / size_per_block)))
        self.bnd_s = np.unique(
            np.quantile(samples.s_pts[:, 0], np.arange(1, nb_s) / nb_s)
        ) if nb_s > 1 else np.empty(0)
        self.bnd_t = np.unique(
            np.quantile(samples.t_pts[:, 0], np.arange(1, nb_t) / nb_t)
        ) if nb_t > 1 else np.empty(0)
        gs, gt = len(self.bnd_s) + 1, len(self.bnd_t) + 1
        lo_s = np.concatenate([[-np.inf], self.bnd_s])
        hi_s = np.concatenate([self.bnd_s, [np.inf]])
        lo_t = np.concatenate([[-np.inf], self.bnd_t])
        hi_t = np.concatenate([self.bnd_t, [np.inf]])
        joinable = ~(
            (lo_t[None, :] > hi_s[:, None] + eps[0])
            | (hi_t[None, :] < lo_s[:, None] - eps[0])
        )
        pairs = np.argwhere(joinable)  # (n_tasks, 2): (S block, T block)
        self._pair_of_srow = [np.flatnonzero(pairs[:, 0] == i) for i in range(gs)]
        self._pair_of_tcol = [np.flatnonzero(pairs[:, 1] == j) for j in range(gt)]
        self.n_tasks = max(1, len(pairs))
        # sink when an input block joins nothing (Definition 1 coverage):
        # route it to task 0 via empty pair lists handled in assign below.
        s_cnt = np.bincount(
            np.searchsorted(self.bnd_s, samples.s_pts[:, 0], "right"), minlength=gs
        ) * samples.sw_s
        t_cnt = np.bincount(
            np.searchsorted(self.bnd_t, samples.t_pts[:, 0], "right"), minlength=gt
        ) * samples.sw_t
        o_load = np.zeros(len(pairs))
        if len(samples.o_s) and len(pairs):
            oi = np.searchsorted(self.bnd_s, samples.o_s[:, 0], "right")
            oj = np.searchsorted(self.bnd_t, samples.o_t[:, 0], "right")
            key = oi * gt + oj
            pair_key = pairs[:, 0] * gt + pairs[:, 1]
            order = np.argsort(pair_key)
            pos = np.searchsorted(pair_key[order], key)
            ok = (pos < len(pairs)) & (pair_key[order][np.minimum(pos, len(pairs) - 1)] == key)
            np.add.at(o_load, order[pos[ok]], samples.sw_o)
        loads = (
            beta2 * (s_cnt[pairs[:, 0]] + t_cnt[pairs[:, 1]]) + beta3 * o_load
            if len(pairs)
            else np.ones(1)
        )
        self.task_to_worker = lpt_schedule(loads, self.w)

    def _expand(self, blocks: np.ndarray, table: list[np.ndarray]):
        counts = np.array([len(table[b]) for b in blocks], dtype=np.int64)
        idx = np.repeat(np.arange(len(blocks), dtype=np.int64), np.maximum(counts, 1))
        tasks = np.concatenate(
            [table[b] if len(table[b]) else np.zeros(1, np.int64) for b in blocks]
        ) if len(blocks) else np.empty(0, np.int64)
        return idx, tasks

    def assign(self, points, side, ids=None):
        points = np.asarray(points, dtype=float)
        x = points[:, 0]
        if side == "S":
            blocks = np.searchsorted(self.bnd_s, x, side="right")
            return self._expand(blocks, self._pair_of_srow)
        blocks = np.searchsorted(self.bnd_t, x, side="right")
        return self._expand(blocks, self._pair_of_tcol)
