"""Table 1/10: band-join characteristics of every dataset/band-width
combination used in the evaluation (input and output sizes).

Usage: spark-submit jobs/table01_datasets.py [--scale 1.0]
(The characteristics are exact combinatorial facts computed by the numpy
substrate; Spark is not needed, keeping the entrypoint spark-submit
compatible is free.)
"""
from __future__ import annotations

import argparse

import numpy as np

from repro.dist.local_join import band_join_count
from repro.harness import experiments as X
from repro.harness.jobio import emit


def rows_config(scale: float):
    n = max(20, int(X.N0 * scale))
    n8 = max(20, int(X.N8 * scale))
    cfg = []
    for e in X.EPS_1D:
        cfg.append((f"pareto-1.5 d=1 eps={e}", X.pareto_inputs(n, 1.5, 1), [e]))
    for e in X.EPS_3D:
        cfg.append((f"pareto-1.5 d=3 eps={e}", X.pareto_inputs(n, 1.5, 3), [e] * 3))
    for z in (0.5, 1.0, 2.0):
        cfg.append(
            (f"pareto-{z} d=3 eps={X.EPS_3D_MID}", X.pareto_inputs(n, z, 3), [X.EPS_3D_MID] * 3)
        )
    for mult in (0.25, 0.5, 1.0, 2.0):
        m = max(20, int(n8 * mult))
        cfg.append(
            (f"pareto-1.5 d=8 eps={X.EPS_8D} n={2*m}", X.pareto_inputs(m, 1.5, 8), [X.EPS_8D] * 8)
        )
    for e in X.EPS_RV_1D:
        cfg.append((f"rv-pareto-1.5 d=1 eps={e}", X.rv_pareto_inputs(n, 1.5, 1), [e]))
    for e in X.EPS_RV_3D:
        cfg.append((f"rv-pareto-1.5 d=3 eps={e}", X.rv_pareto_inputs(n, 1.5, 3), [e] * 3))
    for e in X.EPS_EBIRD:
        cfg.append((f"ebird x cloud d=3 eps={e}", X.ebird_cloud_inputs(scale), [e] * 3))
    for e in X.EPS_PTF:
        cfg.append((f"ptf d=2 eps={e}", X.ptf_inputs(scale), [e] * 2))
    return cfg


def run(scale: float = 1.0) -> list[str]:
    lines = []
    for name, (S, T), eps in rows_config(scale):
        out = band_join_count(S, T, np.asarray(eps, float))
        lines.append(
            f"| {name} | input | {len(S) + len(T)} | output | {out} | "
            f"ratio | {out / (len(S) + len(T)):.3f} |"
        )
    return lines


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    args = ap.parse_args()
    emit("1", "dataset and band-join characteristics", run(args.scale))


if __name__ == "__main__":
    main()
