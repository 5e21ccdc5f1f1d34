"""Tables 2a/2b/2c: impact of band width on all methods.

2a: pareto-1.5 d=1, band widths 0..3 grains (paper: 0..3e-5);
2b: pareto-1.5 d=3 (paper eps 0/2/4 -> ours 0/35/70);
2c: ebird-like x cloud-like d=3 (eps 0/1/2 days-degrees, as the paper).

RecPart's symmetric partitioning is OFF here (RecPart-S), exactly as in
the paper's Section 6.2, so advantages come from partition boundaries
alone. Usage: spark-submit jobs/table02_bandwidth.py [--part a|b|c]
"""
from __future__ import annotations

import argparse

from repro.harness import experiments as X
from repro.harness.jobio import emit
from repro.harness.runner import run_suite
from repro.harness.tables import format_rows


def run(part: str, scale: float = 1.0, w: int = X.W0) -> list[str]:
    n = max(20, int(X.N0 * scale))
    lines: list[str] = []
    if part == "a":
        S, T = X.pareto_inputs(n, 1.5, 1)
        eps_list = [[e] for e in X.EPS_1D]
    elif part == "b":
        S, T = X.pareto_inputs(n, 1.5, 3)
        eps_list = [[e] * 3 for e in X.EPS_3D]
    else:
        S, T = X.ebird_cloud_inputs(scale)
        eps_list = [[e] * 3 for e in X.EPS_EBIRD[:3]]
    for eps in eps_list:
        runs = run_suite(X.MAIN_METHODS, S, T, eps, w, seed=0)
        lines += format_rows(f"eps={eps[0]}", runs)
    return lines


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--part", choices=["a", "b", "c"], default="a")
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--workers", type=int, default=X.W0)
    args = ap.parse_args()
    titles = {
        "a": "band-width impact, pareto-1.5 d=1",
        "b": "band-width impact, pareto-1.5 d=3",
        "c": "band-width impact, ebird-like x cloud-like d=3",
    }
    emit(f"2{args.part}", titles[args.part], run(args.part, args.scale, args.workers))


if __name__ == "__main__":
    main()
