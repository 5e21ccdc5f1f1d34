"""Table 16: RecPart with the *theoretical* termination condition on the
PTF-like sky-survey data (2D band-join on ra/dec, arcsecond band widths
identical to the paper's), vs CS_IO, 1-Bucket and Grid-eps.

Usage: spark-submit jobs/table16_ptf.py [--scale 1.0]
"""
from __future__ import annotations

import argparse

from repro.harness import experiments as X
from repro.harness.jobio import emit
from repro.harness.runner import run_suite
from repro.harness.tables import format_rows


def run(scale: float = 1.0, w: int = X.W0) -> list[str]:
    S, T = X.ptf_inputs(scale)
    lines: list[str] = []
    for e in X.EPS_PTF:
        runs = run_suite(
            ["recpart", "csio", "one_bucket", "grid_eps"],
            S, T, [e, e], w, seed=0, termination="theoretical",
        )
        arcsec = e * 3600
        lines += format_rows(f"eps={arcsec:.0f}arcsec", runs, baseline="recpart")
    return lines


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--workers", type=int, default=X.W0)
    args = ap.parse_args()
    emit("16", "ptf-like sky survey, theoretical termination", run(args.scale, args.workers))


if __name__ == "__main__":
    main()
