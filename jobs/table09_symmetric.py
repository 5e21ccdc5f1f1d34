"""Tables 9/14: RecPart-S vs RecPart — the value of symmetric
partitioning. Ties on similarly-distributed inputs (pareto-1.0,
ebird x cloud), dramatic I_m reduction on reverse-Pareto where only
role-reversal avoids duplicating the dense relation.

Usage: spark-submit jobs/table09_symmetric.py [--scale 1.0]
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
        ("pareto-1.0 (35,35,35)", X.pareto_inputs(n, 1.0, 3), [X.EPS_3D_MID] * 3),
        ("ebird x cloud (0,0,0)", X.ebird_cloud_inputs(scale), [0.0] * 3),
        ("ebird x cloud (2,2,2)", X.ebird_cloud_inputs(scale), [2.0] * 3),
        ("ebird x cloud (4,4,4)", X.ebird_cloud_inputs(scale), [4.0] * 3),
        ("rv-pareto-1.5 3d (1K)", X.rv_pareto_inputs(n, 1.5, 3), [X.EPS_RV_3D[0]] * 3),
        ("rv-pareto-1.5 3d (2K)", X.rv_pareto_inputs(n, 1.5, 3), [X.EPS_RV_3D[1]] * 3),
        ("rv-pareto-1.5 1d eps=2", X.rv_pareto_inputs(n, 1.5, 1), [X.EPS_RV_1D[0]]),
        ("rv-pareto-1.5 1d eps=1000", X.rv_pareto_inputs(n, 1.5, 1), [X.EPS_RV_1D[1]]),
    ]
    lines: list[str] = []
    for name, (S, T), eps in cases:
        runs = run_suite(["recpart_s", "recpart"], S, T, eps, w, seed=0)
        lines += format_rows(name, runs)
    return lines


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--workers", type=int, default=X.W0)
    args = ap.parse_args()
    emit("9", "symmetric partitioning: RecPart-S vs RecPart", run(args.scale, args.workers))


if __name__ == "__main__":
    main()
