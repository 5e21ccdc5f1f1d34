"""Tables 7/11: RecPart-S vs distributed IEJoin's quantile block
partitioning, sweeping the sizePerBlock meta-parameter around its best
value for each query (pareto-z, d in {1,3}).

Usage: spark-submit jobs/table07_iejoin.py [--scale 1.0]
"""
from __future__ import annotations

import argparse

from repro.harness import experiments as X
from repro.harness.jobio import emit
from repro.harness.runner import run_suite
from repro.harness.tables import format_rows

#: (z, d, eps per dim, sizePerBlock sweep). Like the paper, the sweep
#: brackets the best block size found for each query at our scale
#: (wider bands favour larger blocks because every pair of blocks within
#: the band becomes a task).
CASES = [
    (1.5, 3, 0.0, (50, 100, 200)),
    (1.5, 3, X.EPS_3D_MID, (2000, 4000, 8000)),
    (1.0, 3, X.EPS_3D_MID, (2000, 4000, 8000)),
    (0.5, 3, X.EPS_3D_MID, (2000, 4000, 8000)),
]


def run(scale: float = 1.0, w: int = X.W0) -> list[str]:
    n = max(20, int(X.N0 * scale))
    lines: list[str] = []
    for z, d, e, spbs in CASES:
        S, T = X.pareto_inputs(n, z, d)
        eps = [e] * d
        scaled: list[int] = []
        for s in spbs:
            v = max(2, int(round(s * n / X.N0)))
            while v in scaled:  # keep the sweep distinct at tiny test scales
                v += 1
            scaled.append(v)
        methods = ["recpart_s"] + [f"iejoin:{v}" for v in scaled]
        runs = run_suite(methods, S, T, eps, w, seed=0)
        lines += format_rows(f"z={z} eps={e}", runs)
    return lines


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--workers", type=int, default=X.W0)
    args = ap.parse_args()
    emit("7", "RecPart-S vs distributed IEJoin (sizePerBlock sweep)", run(args.scale, args.workers))


if __name__ == "__main__":
    main()
