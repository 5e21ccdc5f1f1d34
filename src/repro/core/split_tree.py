"""Split tree: the recursive partitioning structure of RecPart.

A path from the root to a leaf defines a rectangular partition of the
join-attribute space as the conjunction of the split predicates along
the path (paper Figure 7). Inner nodes carry ``(dim, value, dup_side)``:

* ``dup_side == 'T'`` is a *T-split* (paper default): S is partitioned
  without duplication (``s.A_dim < value`` goes left), while T-tuples
  within band width of the boundary are copied to both children
  (``t - eps < value`` -> left, ``t + eps >= value`` -> right).
* ``dup_side == 'S'`` is the symmetric *S-split* (Section 4.2 extension).

Leaves may be in "small" 1-Bucket mode with an internal r x c matrix
grid: an S-tuple is hashed to a row (and copied to the row's c cells), a
T-tuple to a column (r cells), so every joining pair shares exactly one
cell. Regular leaves are the degenerate r = c = 1 case.

For every result pair (s, t) exactly one leaf cell receives both tuples:
at a T-split, s goes to exactly one child and (because |s-t| <= eps)
t is always copied to that child too; symmetric for S-splits; inside a
leaf, row x column intersect in one cell. This is the paper's
no-duplicate-output guarantee and is property-tested in the test suite.
"""
from __future__ import annotations

import numpy as np

from ..dist.partitioning import Partitioning, hash_ids, lpt_schedule
from .geometry import Rect


class TreeNode:
    """Mutable split-tree node. A node is a leaf iff ``left is None``.

    Leaves own optimizer sample state (attached by RecPart, not used for
    routing) plus the 1-Bucket grid shape ``(r, c)``.
    """

    __slots__ = (
        "rect", "dim", "value", "dup_side", "left", "right",
        "r", "c", "task_base", "payload",
    )

    def __init__(self, rect: Rect):
        self.rect = rect
        self.dim = -1
        self.value = 0.0
        self.dup_side = ""
        self.left: TreeNode | None = None
        self.right: TreeNode | None = None
        self.r = 1
        self.c = 1
        self.task_base = -1
        self.payload = None  # optimizer-owned leaf state

    @property
    def is_leaf(self) -> bool:
        return self.left is None

    def to_inner(self, dim: int, value: float, dup_side: str) -> tuple["TreeNode", "TreeNode"]:
        """Turn this leaf into an inner node with two fresh leaf children."""
        assert self.is_leaf
        lrect, rrect = self.rect.split(dim, value)
        self.dim, self.value, self.dup_side = dim, value, dup_side
        self.left, self.right = TreeNode(lrect), TreeNode(rrect)
        self.payload = None
        return self.left, self.right

    def leaves(self) -> list["TreeNode"]:
        if self.is_leaf:
            return [self]
        return self.left.leaves() + self.right.leaves()

    def clone(self) -> "TreeNode":
        """Structural deep copy (drops optimizer payloads)."""
        n = TreeNode(self.rect)
        n.r, n.c = self.r, self.c
        if not self.is_leaf:
            n.dim, n.value, n.dup_side = self.dim, self.value, self.dup_side
            n.left, n.right = self.left.clone(), self.right.clone()
        return n

    def depth(self) -> int:
        if self.is_leaf:
            return 1
        return 1 + max(self.left.depth(), self.right.depth())


class FrozenTree(Partitioning):
    """Immutable split tree acting as a :class:`Partitioning`.

    Task ids are assigned in leaf order: each leaf gets a contiguous
    block of ``r * c`` cell tasks. ``task_to_worker`` comes from LPT over
    per-cell load estimates supplied by the optimizer (uniform if absent)
    — our stand-in for the paper's cluster scheduler.
    """

    def __init__(
        self,
        root: TreeNode,
        eps: np.ndarray,
        w: int,
        cell_loads: np.ndarray | None = None,
        seed: int = 0,
    ):
        self.root = root.clone()
        self.eps = np.asarray(eps, dtype=float)
        self.w = int(w)
        self.seed = int(seed)
        base = 0
        self._leaves = self.root.leaves()
        for leaf in self._leaves:
            leaf.task_base = base
            base += leaf.r * leaf.c
        self.n_tasks = base
        if cell_loads is None:
            cell_loads = np.ones(self.n_tasks)
        assert len(cell_loads) == self.n_tasks, (len(cell_loads), self.n_tasks)
        self.task_to_worker = lpt_schedule(np.asarray(cell_loads, dtype=float), self.w)

    # -- Algorithm 3 (vectorized): route tuples down the tree ------------
    def assign(self, points, side, ids=None):
        points = np.asarray(points, dtype=float)
        if points.ndim == 1:
            points = points[:, None]
        n = len(points)
        if ids is None:
            ids = np.arange(n, dtype=np.int64)
        out_idx: list[np.ndarray] = []
        out_task: list[np.ndarray] = []
        dup = side  # relation that gets duplicated at matching split nodes
        stack: list[tuple[TreeNode, np.ndarray]] = [(self.root, np.arange(n, dtype=np.int64))]
        while stack:
            node, idx = stack.pop()
            if len(idx) == 0:
                continue
            if node.is_leaf:
                r, c = node.r, node.c
                if r == 1 and c == 1:
                    out_idx.append(idx)
                    out_task.append(np.full(len(idx), node.task_base, dtype=np.int64))
                elif side == "S":
                    row = hash_ids(ids[idx], self.seed + node.task_base, r)
                    # copy to all c cells of the chosen row
                    out_idx.append(np.repeat(idx, c))
                    cells = (row[:, None] * c + np.arange(c)[None, :]).ravel()
                    out_task.append(node.task_base + cells)
                else:
                    col = hash_ids(ids[idx], self.seed + 7919 + node.task_base, c)
                    out_idx.append(np.repeat(idx, r))
                    cells = (np.arange(r)[None, :] * c + col[:, None]).ravel()
                    out_task.append(node.task_base + cells)
                continue
            x = points[idx, node.dim]
            if dup == node.dup_side:
                e = self.eps[node.dim]
                left = x - e < node.value
                right = x + e >= node.value
            else:
                left = x < node.value
                right = ~left
            stack.append((node.left, idx[left]))
            stack.append((node.right, idx[right]))
        if not out_idx:
            return np.empty(0, np.int64), np.empty(0, np.int64)
        idx = np.concatenate(out_idx)
        task = np.concatenate(out_task)
        order = np.argsort(idx, kind="stable")  # deterministic row order
        return idx[order], task[order]

    def route_pairs(
        self,
        s_pts: np.ndarray,
        t_pts: np.ndarray,
        s_ids: np.ndarray | None = None,
        t_ids: np.ndarray | None = None,
    ) -> np.ndarray:
        """Task where each output pair is produced: follow **s** at
        T-splits (s is routed uniquely there) and **t** at S-splits;
        inside a leaf, the pair lands in cell (row(s), col(t))."""
        n = len(s_pts)
        if s_ids is None:
            s_ids = np.arange(n, dtype=np.int64)
        if t_ids is None:
            t_ids = np.arange(n, dtype=np.int64)
        tasks = np.empty(n, dtype=np.int64)
        stack: list[tuple[TreeNode, np.ndarray]] = [(self.root, np.arange(n, dtype=np.int64))]
        while stack:
            node, idx = stack.pop()
            if len(idx) == 0:
                continue
            if node.is_leaf:
                r, c = node.r, node.c
                row = hash_ids(s_ids[idx], self.seed + node.task_base, r)
                col = hash_ids(t_ids[idx], self.seed + 7919 + node.task_base, c)
                tasks[idx] = node.task_base + row * c + col
                continue
            x = (s_pts if node.dup_side == "T" else t_pts)[idx, node.dim]
            left = x < node.value
            stack.append((node.left, idx[left]))
            stack.append((node.right, idx[~left]))
        return tasks

    @property
    def n_leaves(self) -> int:
        return len(self._leaves)
