"""Tables 8/13: impact of the local-join-cost weight. Sweeping
beta2/beta1 across 10^-4..10^4 shows RecPart trading a little extra
input duplication (I) for lower max worker load (L_m = 4*I_m + O_m) as
local compute gets more expensive; the competitors ignore the ratio.

Uses the applied (cost-model) termination since the ratio enters through
the model. ebird-like x cloud-like, d=3.

Usage: spark-submit jobs/table08_beta_ratio.py [--scale 1.0]
"""
from __future__ import annotations

import argparse

import numpy as np

from repro.core.cost_model import CostModel
from repro.harness import experiments as X
from repro.harness.jobio import emit
from repro.harness.runner import run_method, run_suite

RATIOS = [1e-4, 1e-2, 1.0, 1e2, 1e4]


def run(scale: float = 1.0, w: int = X.W0) -> list[str]:
    S, T = X.ebird_cloud_inputs(scale)
    eps = np.array([2.0, 2.0, 2.0])
    lines: list[str] = []
    for ratio in RATIOS:
        cm = CostModel().with_ratio(ratio)
        r = run_method(
            "recpart", S, T, eps, w, cost_model=cm, seed=0, termination="applied"
        )
        ev = r.eval
        lm = 4 * ev.I_m + ev.O_m
        lines.append(
            f"| b2/b1={ratio:g} | RecPart | {r.total_time:.2f} | - | "
            f"{ev.I} | {ev.I_m} | {ev.O_m} | Lm(4Im+Om)={lm} |"
        )
    runs = run_suite(["csio", "one_bucket", "grid_eps"], S, T, eps, w, seed=0)
    for m, r in runs.items():
        if r is None:
            continue
        ev = r.eval
        lines.append(
            f"| any ratio | {r.pretty} | {r.total_time:.2f} | - | "
            f"{ev.I} | {ev.I_m} | {ev.O_m} | Lm(4Im+Om)={4*ev.I_m+ev.O_m} |"
        )
    return lines


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--workers", type=int, default=X.W0)
    args = ap.parse_args()
    emit("8", "local-join cost ratio sweep (beta2/beta1)", run(args.scale, args.workers))


if __name__ == "__main__":
    main()
