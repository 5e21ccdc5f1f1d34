"""Table 6: Grid* vs RecPart on the settings where grid partitioning
fails — high skew (pareto-2.0) and the anti-correlated reverse-Pareto
distributions (Lemma 2's dense eps-ranges).

Usage: spark-submit jobs/table06_gridstar.py [--scale 1.0]
"""
from __future__ import annotations

import argparse

from repro.harness import experiments as X
from repro.harness.jobio import emit
from repro.harness.runner import run_suite
from repro.harness.tables import format_rows


def run(scale: float = 1.0, w: int = X.W0) -> list[str]:
    n = max(20, int(X.N0 * scale))
    cases = [
        ("pareto-2.0 (35,35,35)", X.pareto_inputs(n, 2.0, 3), [X.EPS_3D_MID] * 3),
        ("rv-pareto-1.5 (1K,1K,1K)", X.rv_pareto_inputs(n, 1.5, 3), [X.EPS_RV_3D[0]] * 3),
        ("rv-pareto-1.5 (2K,2K,2K)", X.rv_pareto_inputs(n, 1.5, 3), [X.EPS_RV_3D[1]] * 3),
    ]
    lines: list[str] = []
    for name, (S, T), eps in cases:
        runs = run_suite(["recpart", "grid_star"], S, T, eps, w, seed=0)
        star = runs["grid_star"]
        if star is not None:
            name = f"{name} j={star.extra.get('grid_j')}"
        lines += format_rows(name, runs, baseline="recpart")
    return lines


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--workers", type=int, default=X.W0)
    args = ap.parse_args()
    emit("6", "Grid* vs RecPart on adversarial data", run(args.scale, args.workers))


if __name__ == "__main__":
    main()
