"""Table 3: skew resistance — pareto-z, d=3, fixed band width, skew
z in {0.5, 1.0, 1.5, 2.0} (paper eps=(2,2,2) -> ours (35,35,35)).

Usage: spark-submit jobs/table03_skew.py [--scale 1.0]
"""
from __future__ import annotations

import argparse

from repro.harness import experiments as X
from repro.harness.jobio import emit
from repro.harness.runner import run_suite
from repro.harness.tables import format_rows


def run(scale: float = 1.0, w: int = X.W0, zs=(0.5, 1.0, 1.5, 2.0)) -> list[str]:
    n = max(20, int(X.N0 * scale))
    eps = [X.EPS_3D_MID] * 3
    lines: list[str] = []
    for z in zs:
        S, T = X.pareto_inputs(n, z, 3)
        runs = run_suite(X.MAIN_METHODS, S, T, eps, w, seed=0)
        lines += format_rows(f"pareto-{z}", runs)
    return lines


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--workers", type=int, default=X.W0)
    args = ap.parse_args()
    emit("3", "skew resistance, pareto-z d=3", run(args.scale, args.workers))


if __name__ == "__main__":
    main()
