"""Figure-4-style checks: RecPart stays near both lower bounds across a
grid of settings and dominates every competitor (Section 6.10).

At our 1/2000 input scale the band windows are relatively wider than the
paper's (DESIGN.md Section 3), so the RecPart thresholds here are 35%
instead of the paper's 10%; the competitors exceed them by integer
factors, which is the shape the paper's Figure 4 shows on a log scale.
"""
import numpy as np
import pytest

from repro.core.recpart import recpart
from repro.dist.metrics import evaluate_partitioning
from repro.harness.runner import run_suite
from repro.synth_data import pareto_points, rv_pareto_points

SETTINGS = [
    ("pareto-1.5 d=1 eps=0", 1, 1.5, 0.0),
    ("pareto-1.5 d=1 eps=.1", 1, 1.5, 0.1),
    ("pareto-1.5 d=3 eps=35", 3, 1.5, 35.0),
    ("pareto-0.5 d=3 eps=35", 3, 0.5, 35.0),
    ("pareto-2.0 d=3 eps=35", 3, 2.0, 35.0),
]


@pytest.mark.parametrize("name,d,z,e", SETTINGS, ids=[s[0] for s in SETTINGS])
def test_recpart_near_lower_bounds(name, d, z, e):
    S = pareto_points(8000, z, d, seed=50)
    T = pareto_points(8000, z, d, seed=51)
    eps = np.full(d, e)
    res = recpart(S, T, eps, w=15, seed=0, termination="theoretical")
    ev = evaluate_partitioning(res.partitioning, S, T, eps)
    assert ev.dup_overhead < 0.35, f"{name}: dup {ev.dup_overhead:.2f}"
    assert ev.load_overhead < 0.35, f"{name}: load {ev.load_overhead:.2f}"


def test_recpart_near_bounds_on_rv_pareto():
    S = rv_pareto_points(8000, 1.5, 1, seed=52, side="S")
    T = rv_pareto_points(8000, 1.5, 1, seed=53, side="T")
    eps = np.array([1000.0])
    res = recpart(S, T, eps, w=15, seed=0, termination="theoretical")
    ev = evaluate_partitioning(res.partitioning, S, T, eps)
    assert ev.dup_overhead < 0.35 and ev.load_overhead < 0.35


def test_recpart_dominates_all_competitors_3d():
    """The paper's headline: RecPart beats every competitor on *both*
    duplication and max load, by a wide margin."""
    S = pareto_points(10_000, 1.5, 3, seed=54)
    T = pareto_points(10_000, 1.5, 3, seed=55)
    eps = np.full(3, 40.0)
    runs = run_suite(
        ["recpart_s", "csio", "one_bucket", "grid_eps", "iejoin:500"],
        S, T, eps, w=15, seed=0,
    )
    rp = runs["recpart_s"].eval
    for m in ("csio", "one_bucket", "grid_eps", "iejoin:500"):
        other = runs[m].eval
        assert rp.I < other.I, m
        assert rp.L_m < other.L_m, m
    # wide margin on duplication for the condition-oblivious covers
    assert runs["one_bucket"].eval.I > 3 * rp.I
    assert runs["grid_eps"].eval.I > 5 * rp.I


def test_recpart_partition_quality_beats_csio_at_scale():
    """RecPart must find strictly better partitionings (both less
    duplication and lower max load) than CS_IO on multidimensional
    input. (The paper's other CS_IO weak spot — optimization time from
    its O(n^5 log n) tiling — is NOT reproduced: our covering heuristic
    is far cheaper than the published tiler; see EXPERIMENTS.md
    'Deviations'.)"""
    S = pareto_points(30_000, 1.5, 3, seed=56)
    T = pareto_points(30_000, 1.5, 3, seed=57)
    eps = np.full(3, 40.0)
    runs = run_suite(["recpart_s", "csio"], S, T, eps, w=30, seed=0)
    assert runs["recpart_s"].eval.dup_overhead < runs["csio"].eval.dup_overhead
    assert runs["recpart_s"].eval.load_overhead < runs["csio"].eval.load_overhead
