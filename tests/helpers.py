"""Shared test utilities: brute-force band-join ground truth and
partitioning-correctness assertions (Definition 1)."""
from __future__ import annotations

import numpy as np

from repro.dist.metrics import collect_all_pairs


def brute_force_pairs(S: np.ndarray, T: np.ndarray, eps) -> np.ndarray:
    """All (s_row, t_row) band-join pairs by dense comparison."""
    S = np.atleast_2d(np.asarray(S, float))
    T = np.atleast_2d(np.asarray(T, float))
    if S.shape[0] == 1 and S.shape[1] > 1 and np.asarray(eps).size == 1:
        S = S.T
    if T.shape[0] == 1 and T.shape[1] > 1 and np.asarray(eps).size == 1:
        T = T.T
    eps = np.asarray(eps, float)
    out = []
    for i in range(0, len(S), 512):
        chunk = S[i : i + 512]
        ok = np.ones((len(chunk), len(T)), bool)
        for d in range(S.shape[1]):
            ok &= np.abs(chunk[:, d][:, None] - T[:, d][None, :]) <= eps[d]
        si, ti = np.nonzero(ok)
        out.append(np.column_stack([si + i, ti]))
    return np.vstack(out) if out else np.empty((0, 2), np.int64)


def brute_force_count(S, T, eps) -> int:
    return len(brute_force_pairs(S, T, eps))


def assert_partitioning_correct(part, S, T, eps) -> None:
    """Definition 1: the partitioned execution must produce exactly the
    band-join result, each pair exactly once."""
    got = collect_all_pairs(part, S, T, eps)
    want = brute_force_pairs(S, T, eps)
    got_keys = set(map(tuple, got.tolist()))
    want_keys = set(map(tuple, want.tolist()))
    assert len(got) == len(got_keys), "a result pair was produced more than once"
    assert got_keys == want_keys, (
        f"result mismatch: missing={len(want_keys - got_keys)} "
        f"extra={len(got_keys - want_keys)}"
    )
