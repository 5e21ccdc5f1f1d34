"""Tables 4a-4d: scalability.

4a: pareto-1.5 d=3 — input and workers doubled together (n/2 @ 15w,
    n @ 30w, 2n @ 60w);
4b: same scaling for ebird-like x cloud-like;
4c: pareto-1.5 d=8 (wide bands) — input varies, w=30 fixed;
4d: pareto-1.5 d=8 — workers vary {1, 15, 30, 60}, input fixed.

The 8-dimensional parts run at the smaller N8 base (the paper likewise
had to model-estimate join time there; see DESIGN.md). RecPart runs in
full symmetric mode for 4c/4d, matching the paper's method names.

Usage: spark-submit jobs/table04_scalability.py [--part a|b|c|d]
"""
from __future__ import annotations

import argparse

from repro.harness import experiments as X
from repro.harness.jobio import emit
from repro.harness.runner import run_suite
from repro.harness.tables import format_rows


def run(part: str, scale: float = 1.0) -> list[str]:
    lines: list[str] = []
    if part in ("a", "b"):
        eps = [X.EPS_3D_MID] * 3 if part == "a" else [2.0, 2.0, 2.0]
        for mult, w in ((0.5, 15), (1.0, 30), (2.0, 60)):
            if part == "a":
                n = max(20, int(X.N0 * scale * mult))
                S, T = X.pareto_inputs(n, 1.5, 3)
            else:
                S, T = X.ebird_cloud_inputs(scale * mult)
            runs = run_suite(X.MAIN_METHODS, S, T, eps, w, seed=0)
            lines += format_rows(f"n={len(S)+len(T)}/w={w}", runs)
    elif part == "c":
        eps = [X.EPS_8D] * 8
        for mult in (0.25, 0.5, 1.0, 2.0):
            n = max(20, int(X.N8 * scale * mult))
            S, T = X.pareto_inputs(n, 1.5, 8)
            runs = run_suite(
                ["recpart", "csio", "one_bucket", "grid_eps"], S, T, eps, 30, seed=0
            )
            lines += format_rows(f"n={len(S)+len(T)}", runs)
    else:
        eps = [X.EPS_8D] * 8
        n = max(20, int(X.N8 * scale))
        S, T = X.pareto_inputs(n, 1.5, 8)
        for w in (1, 15, 30, 60):
            runs = run_suite(
                ["recpart", "csio", "one_bucket", "grid_eps"], S, T, eps, w, seed=0
            )
            lines += format_rows(f"w={w}", runs)
    return lines


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--part", choices=["a", "b", "c", "d"], default="a")
    ap.add_argument("--scale", type=float, default=1.0)
    args = ap.parse_args()
    titles = {
        "a": "scalability (input+workers), pareto-1.5 d=3",
        "b": "scalability (input+workers), ebird-like x cloud-like",
        "c": "scalability (input only), pareto-1.5 d=8",
        "d": "scalability (workers only), pareto-1.5 d=8",
    }
    emit(f"4{args.part}", titles[args.part], run(args.part, args.scale))


if __name__ == "__main__":
    main()
