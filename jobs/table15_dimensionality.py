"""Table 15 (and Section 6.2.2): impact of join dimensionality —
pareto-1.5, d in {1, 2, 4, 8}, same per-dimension band width, so output
shrinks by orders of magnitude per added dimension while Grid-eps
duplication explodes as ~3^d.

Usage: spark-submit jobs/table15_dimensionality.py [--scale 1.0]
"""
from __future__ import annotations

import argparse

from repro.harness import experiments as X
from repro.harness.jobio import emit
from repro.harness.runner import run_suite
from repro.harness.tables import format_rows


def run(scale: float = 1.0, w: int = X.W0, dims=(1, 2, 4, 8)) -> list[str]:
    n = max(20, int(X.N0 * scale))
    lines: list[str] = []
    for d in dims:
        S, T = X.pareto_inputs(n, 1.5, d)
        eps = [X.EPS_15] * d
        runs = run_suite(
            ["recpart", "csio", "one_bucket", "grid_eps"], S, T, eps, w, seed=0
        )
        lines += format_rows(f"d={d}", runs, baseline="recpart")
    return lines


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--workers", type=int, default=X.W0)
    args = ap.parse_args()
    emit("15", "dimensionality sweep, pareto-1.5 d=1..8", run(args.scale, args.workers))


if __name__ == "__main__":
    main()
