"""Table 5: grid-size sweep for Grid-eps plus the Grid* auto-tuner,
against RecPart-S, CS_IO and 1-Bucket (pareto-1.5 d=3).

Usage: spark-submit jobs/table05_gridsize.py [--scale 1.0]
"""
from __future__ import annotations

import argparse

import numpy as np

from repro.baselines.grid_eps import GridPartitioning
from repro.core.cost_model import CostModel
from repro.dist.metrics import evaluate_partitioning
from repro.harness import experiments as X
from repro.harness.jobio import emit
from repro.harness.runner import run_suite
from repro.harness.tables import format_rows


def run(scale: float = 1.0, w: int = X.W0) -> list[str]:
    n = max(20, int(X.N0 * scale))
    S, T = X.pareto_inputs(n, 1.5, 3)
    eps = np.array([X.EPS_3D_MID] * 3)
    cm = CostModel()
    lines: list[str] = []
    for j in (1, 2, 4, 8, 16, 32, 64):
        part = GridPartitioning(S, T, eps, j * eps, w, seed=0)
        ev = evaluate_partitioning(part, S, T, eps, beta2=cm.b2, beta3=cm.b3)
        t = cm.predict(ev.I, ev.I_m, ev.O_m)
        lines.append(
            f"| grid j={j} | Grid({j}eps) | {t:.2f} (0.00+{t:.2f}) | - | "
            f"{ev.I} | {ev.I_m} | {ev.O_m} | "
            f"dup={ev.dup_overhead:.1%} load={ev.load_overhead:.1%} |"
        )
    runs = run_suite(
        ["recpart_s", "csio", "one_bucket", "grid_star"], S, T, eps, w, seed=0
    )
    lines += format_rows("tuned", runs)
    star = runs["grid_star"]
    if star is not None:
        lines.append(f"| tuned | Grid* chose j={star.extra.get('grid_j')} | | | | | | |")
    return lines


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--workers", type=int, default=X.W0)
    args = ap.parse_args()
    emit("5", "Grid-eps grid-size sweep and Grid*", run(args.scale, args.workers))


if __name__ == "__main__":
    main()
