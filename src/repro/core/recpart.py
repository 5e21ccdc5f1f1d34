"""RecPart: recursive partitioning for distributed band-joins (Alg. 1-2).

Grows the split tree from a single root leaf. Each iteration pops the
leaf with the best split score from a priority queue and applies that
split: a regular leaf becomes an inner node with two children; a
"small" leaf (every side <= 2*eps) instead increments its internal
1-Bucket grid (r or c). Split score is the paper's new measure:

    ratio of load-variance reduction to input-duplication increase,

with zero-duplication splits ranked above all others and ordered among
themselves by variance reduction. Loads are estimated from fixed-size
input and output samples (Section 4.2); the (w-1)/w^2 factor of the
variance is constant across all comparisons and is dropped.

Two termination rules (Section 4.2):

* ``theoretical`` — track max{duplication overhead, load overhead} vs
  the Lemma-1 lower bounds; duplication overhead grows monotonically, so
  stop once it exceeds the best load overhead seen.
* ``applied`` — predict join time with the cost model M(I, I_m, O_m);
  stop when the best prediction improved < 1% over the last w
  iterations.

The best partitioning seen (by the active objective) is snapshotted as a
:class:`FrozenTree` and returned.
"""
from __future__ import annotations

import heapq
import itertools
import time
from dataclasses import dataclass, field

import numpy as np

from ..dist.partitioning import lpt_schedule
from .cost_model import CostModel
from .geometry import Rect
from .sampling import Samples, draw_samples
from .split_tree import FrozenTree, TreeNode

#: split score = variance reduction / duplication increase. A sample
#: showing zero duplicates only bounds the true duplication below one
#: sample weight, so the denominator is floored at one sample tuple's
#: weight (add-one smoothing). This realizes the paper's rule — ratio
#: ranks splits, and among (estimated) zero-duplication splits the one
#: with the greatest variance reduction wins — without letting
#: negligible-variance zero-dup splits starve high-ratio splits.
ScoreKey = float
_NO_SPLIT: ScoreKey = -np.inf


@dataclass
class LeafState:
    """Optimizer-owned sample state of one split-tree leaf."""

    S: np.ndarray
    T: np.ndarray
    Os: np.ndarray
    Ot: np.ndarray
    best_key: ScoreKey = _NO_SPLIT
    best_split: tuple | None = None
    stamp: int = 0


@dataclass
class RecPartResult:
    partitioning: FrozenTree
    opt_time: float
    n_iters: int
    objective: float
    history: list[dict] = field(default_factory=list)
    samples: Samples | None = None


class _Optimizer:
    def __init__(self, samples, eps, w, cm, symmetric, termination, seed, max_iters):
        self.sm = samples
        self.eps = np.asarray(eps, dtype=float)
        self.w = int(w)
        self.cm = cm
        self.symmetric = symmetric
        self.termination = termination
        self.seed = seed
        self.max_iters = max_iters if max_iters is not None else 20 * w + 100
        d = samples.s_pts.shape[1]
        root_rect = Rect.bounding(samples.s_pts, samples.t_pts, pad=1.0 + 1e-9)
        self.root = TreeNode(root_rect)
        self.root.payload = LeafState(
            S=samples.s_pts, T=samples.t_pts, Os=samples.o_s, Ot=samples.o_t
        )
        self.heap: list = []
        self.counter = itertools.count()
        self.history: list[dict] = []

    # -- per-leaf load/estimate helpers ------------------------------------
    def _leaf_cells(self, node: TreeNode):
        """(per-cell input est, per-cell output est, n_cells) of a leaf."""
        st: LeafState = node.payload
        r, c = node.r, node.c
        inp = self.sm.sw_s * len(st.S) / r + self.sm.sw_t * len(st.T) / c
        out = self.sm.sw_o * len(st.Os) / (r * c)
        return inp, out, r * c

    def _leaf_sumsq(self, node: TreeNode) -> float:
        inp, out, n = self._leaf_cells(node)
        l = self.cm.b2 * inp + self.cm.b3 * out
        return n * l * l

    def _leaf_input(self, node: TreeNode) -> float:
        st: LeafState = node.payload
        return self.sm.sw_s * len(st.S) * node.c + self.sm.sw_t * len(st.T) * node.r

    # -- Algorithm 2: best_split -------------------------------------------
    def best_split(self, node: TreeNode) -> tuple[ScoreKey, tuple | None]:
        if node.rect.is_small(self.eps):
            return self._best_split_small(node)
        key, split = self._best_split_regular(node)
        if split is None:
            # No recursive split exists (e.g. a point-mass partition of a
            # heavy join value at eps=0). All tuples in such a partition
            # join with each other, which is precisely the Cartesian-
            # product regime the paper's small-partition mode targets, so
            # fall back to internal 1-Bucket refinement.
            return self._best_split_small(node)
        return key, split

    def _best_split_regular(self, node: TreeNode):
        st: LeafState = node.payload
        b2, b3 = self.cm.b2, self.cm.b3
        sw_s, sw_t, sw_o = self.sm.sw_s, self.sm.sw_t, self.sm.sw_o
        l_leaf = b2 * (sw_s * len(st.S) + sw_t * len(st.T)) + b3 * sw_o * len(st.Os)
        lsq = l_leaf * l_leaf
        best_key: ScoreKey = _NO_SPLIT
        best: tuple | None = None
        splittable = ~node.rect.small_dims(self.eps)
        dup_sides = ("T", "S") if self.symmetric else ("T",)
        for dim in np.nonzero(splittable)[0]:
            lo, hi = node.rect.lo[dim], node.rect.hi[dim]
            e = self.eps[dim]
            for dup_side in dup_sides:
                if dup_side == "T":
                    P, D, Or = st.S[:, dim], st.T[:, dim], st.Os[:, dim]
                    sw_P, sw_D = sw_s, sw_t
                else:
                    P, D, Or = st.T[:, dim], st.S[:, dim], st.Ot[:, dim]
                    sw_P, sw_D = sw_t, sw_s
                u = np.unique(P)
                if len(u) < 2:
                    continue
                mids = (u[:-1] + u[1:]) / 2.0
                mids = mids[(mids > lo) & (mids < hi)]
                if len(mids) == 0:
                    continue
                Ps = np.sort(P)
                Ds = np.sort(D)
                Ors = np.sort(Or)
                pL = np.searchsorted(Ps, mids, side="left")
                dL = np.searchsorted(Ds, mids + e, side="left")
                dR = len(Ds) - np.searchsorted(Ds, mids - e, side="left")
                dup_cnt = dL + dR - len(Ds)
                oL = np.searchsorted(Ors, mids, side="left")
                oR = len(Ors) - oL
                if dup_side == "T":
                    sL, tL, sR, tR = pL, dL, len(Ps) - pL, dR
                else:
                    tL, sL, tR, sR = pL, dL, len(Ps) - pL, dR
                l1 = b2 * (sw_s * sL + sw_t * tL) + b3 * sw_o * oL
                l2 = b2 * (sw_s * sR + sw_t * tR) + b3 * sw_o * oR
                dvar = lsq - l1 * l1 - l2 * l2
                dup_tuples = np.maximum(dup_cnt * sw_D, sw_D)  # add-one floor
                valid = dvar > 0
                if not valid.any():
                    continue
                ratio = np.where(valid, dvar / dup_tuples, -np.inf)
                k = int(np.argmax(ratio))
                if ratio[k] > best_key:
                    best_key = float(ratio[k])
                    best = ("regular", int(dim), float(mids[k]), dup_side)
        return best_key, best

    def _best_split_small(self, node: TreeNode):
        """Small partition: score incrementing the internal 1-Bucket grid.
        A row increment duplicates every T-tuple once more; a column
        increment duplicates every S-tuple once more. RecPart-S never
        duplicates S (paper Section 6.2: "T is always the partitioned/
        duplicated relation"), so without symmetric partitioning only
        row increments are allowed — which is precisely why RecPart-S
        cannot break up a dense pure-T region (paper Table 9's
        reverse-Pareto rows) while full RecPart can."""
        st: LeafState = node.payload
        sw_s, sw_t = self.sm.sw_s, self.sm.sw_t
        cur = self._leaf_sumsq(node)

        def sumsq(r, c):
            inp = sw_s * len(st.S) / r + sw_t * len(st.T) / c
            out = self.sm.sw_o * len(st.Os) / (r * c)
            l = self.cm.b2 * inp + self.cm.b3 * out
            return r * c * l * l

        best_key: ScoreKey = _NO_SPLIT
        best: tuple | None = None
        options = [("row", sw_t * len(st.T), sw_t)]
        if self.symmetric:
            options.append(("col", sw_s * len(st.S), sw_s))
        for split, dup, floor in options:
            r = node.r + (split == "row")
            c = node.c + (split == "col")
            dvar = cur - sumsq(r, c)
            if dvar <= 0:
                continue
            key = dvar / max(dup, floor)
            if key > best_key:
                best_key, best = key, (split,)
        return best_key, best

    # -- queue management ----------------------------------------------------
    def _push(self, node: TreeNode):
        st: LeafState = node.payload
        st.best_key, st.best_split = self.best_split(node)
        if st.best_split is None:
            return
        st.stamp += 1
        heapq.heappush(
            self.heap, (-st.best_key, next(self.counter), node, st.stamp)
        )

    def _pop(self) -> TreeNode | None:
        while self.heap:
            _, _, node, stamp = heapq.heappop(self.heap)
            st: LeafState = node.payload
            if st is not None and node.is_leaf and st.stamp == stamp:
                return node
        return None

    # -- apply a split (one repeat-loop iteration of Algorithm 1) -----------
    def apply_split(self, node: TreeNode):
        st: LeafState = node.payload
        split = st.best_split
        if split[0] == "regular":
            _, dim, value, dup_side = split
            e = self.eps[dim]
            if dup_side == "T":
                s_mask = st.S[:, dim] < value
                t_left = st.T[:, dim] - e < value
                t_right = st.T[:, dim] + e >= value
                o_mask = st.Os[:, dim] < value
                SL, SR = st.S[s_mask], st.S[~s_mask]
                TL, TR = st.T[t_left], st.T[t_right]
            else:
                t_mask = st.T[:, dim] < value
                s_left = st.S[:, dim] - e < value
                s_right = st.S[:, dim] + e >= value
                o_mask = st.Ot[:, dim] < value
                SL, SR = st.S[s_left], st.S[s_right]
                TL, TR = st.T[t_mask], st.T[~t_mask]
            left, right = node.to_inner(dim, value, dup_side)
            left.payload = LeafState(S=SL, T=TL, Os=st.Os[o_mask], Ot=st.Ot[o_mask])
            right.payload = LeafState(S=SR, T=TR, Os=st.Os[~o_mask], Ot=st.Ot[~o_mask])
            self._push(left)
            self._push(right)
        else:
            if split[0] == "row":
                node.r += 1
            else:
                node.c += 1
            self._push(node)

    # -- global estimated state ----------------------------------------------
    def estimate_state(self, root: TreeNode) -> dict:
        """Estimated (I, I_m, O_m, L_m) of the current tree via LPT
        scheduling of all leaf cells onto the w workers."""
        loads, inps, outs = [], [], []
        I_est = 0.0
        for leaf in root.leaves():
            inp, out, n = self._leaf_cells(leaf)
            I_est += self._leaf_input(leaf)
            loads.extend([self.cm.b2 * inp + self.cm.b3 * out] * n)
            inps.extend([inp] * n)
            outs.extend([out] * n)
        loads = np.asarray(loads)
        inps = np.asarray(inps)
        outs = np.asarray(outs)
        tw = lpt_schedule(loads, self.w)
        w_load = np.bincount(tw, weights=loads, minlength=self.w)
        w_in = np.bincount(tw, weights=inps, minlength=self.w)
        w_out = np.bincount(tw, weights=outs, minlength=self.w)
        m = int(np.argmax(w_load))
        return {
            "I": I_est,
            "I_m": float(w_in[m]),
            "O_m": float(w_out[m]),
            "L_m": float(w_load[m]),
            "cell_loads": loads,
        }

    def run(self) -> RecPartResult:
        t_start = time.perf_counter()
        n_in = self.sm.n_s + self.sm.n_t
        O_est = self.sm.o_total_est
        L0 = (self.cm.b2 * n_in + self.cm.b3 * O_est) / self.w

        def objective(state):
            dup_ov = (state["I"] - n_in) / n_in
            load_ov = (state["L_m"] - L0) / L0 if L0 > 0 else 0.0
            if self.termination == "theoretical":
                return max(dup_ov, load_ov), dup_ov, load_ov
            t = self.cm.predict(state["I"], state["I_m"], state["O_m"])
            return t, dup_ov, load_ov

        self._push(self.root)
        state = self.estimate_state(self.root)
        obj, dup_ov, load_ov = objective(state)
        best_obj = obj
        best_tree = FrozenTree(self.root, self.eps, self.w, state["cell_loads"], self.seed)
        best_load_ov = load_ov
        objs = [obj]
        self.history.append({"iter": 0, "obj": obj, "dup_ov": dup_ov, "load_ov": load_ov})

        for it in range(1, self.max_iters + 1):
            node = self._pop()
            if node is None:
                break
            self.apply_split(node)
            state = self.estimate_state(self.root)
            obj, dup_ov, load_ov = objective(state)
            objs.append(obj)
            self.history.append(
                {"iter": it, "obj": obj, "dup_ov": dup_ov, "load_ov": load_ov}
            )
            if obj < best_obj:
                best_obj = obj
                best_tree = FrozenTree(
                    self.root, self.eps, self.w, state["cell_loads"], self.seed
                )
            best_load_ov = min(best_load_ov, load_ov)
            if self.termination == "theoretical":
                # duplication overhead is monotone; once it alone exceeds the
                # best load overhead seen, no later tree can win.
                if dup_ov > best_load_ov:
                    break
            else:
                if len(objs) > self.w:
                    if min(objs) > 0.99 * min(objs[: -self.w]):
                        break
        return RecPartResult(
            partitioning=best_tree,
            opt_time=time.perf_counter() - t_start,
            n_iters=len(objs) - 1,
            objective=best_obj,
            history=self.history,
            samples=self.sm,
        )


def recpart(
    S_pts: np.ndarray,
    T_pts: np.ndarray,
    eps,
    w: int,
    *,
    symmetric: bool = True,
    termination: str = "applied",
    cost_model: CostModel | None = None,
    seed: int = 0,
    k_input: int = 8192,
    k_output_base: int = 20000,
    max_iters: int | None = None,
    samples: Samples | None = None,
) -> RecPartResult:
    """Run RecPart (``symmetric=True``) or RecPart-S (``symmetric=False``)
    and return the best frozen partitioning plus optimization stats."""
    eps = np.asarray(eps, dtype=float)
    cm = cost_model or CostModel()
    if samples is None:
        samples = draw_samples(
            np.asarray(S_pts, dtype=float),
            np.asarray(T_pts, dtype=float),
            eps,
            k_input=k_input,
            k_output_base=k_output_base,
            seed=seed,
        )
    opt = _Optimizer(samples, eps, w, cm, symmetric, termination, seed, max_iters)
    return opt.run()
