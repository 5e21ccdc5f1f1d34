"""pytest-benchmark targets — one per reproduced table.

Each benchmark regenerates its table at a reduced scale (the full-scale
runs live in jobs/ and their outputs in results/ and EXPERIMENTS.md).
``pedantic`` with one round: a table run is minutes-scale work, the
benchmark measures end-to-end harness cost, not microseconds.
"""
import pytest

SCALE = 0.05
W = 8


def _one(benchmark, fn, *args, **kw):
    result = benchmark.pedantic(fn, args=args, kwargs=kw, rounds=1, iterations=1)
    assert result


def test_b01_datasets(benchmark, load_job):
    _one(benchmark, load_job("table01_datasets").run, scale=0.02)


@pytest.mark.parametrize("part", ["a", "b", "c"])
def test_b02_bandwidth(benchmark, load_job, part):
    _one(benchmark, load_job("table02_bandwidth").run, part, scale=SCALE, w=W)


def test_b03_skew(benchmark, load_job):
    _one(benchmark, load_job("table03_skew").run, scale=SCALE, w=W)


@pytest.mark.parametrize("part", ["a", "b", "c", "d"])
def test_b04_scalability(benchmark, load_job, part):
    _one(benchmark, load_job("table04_scalability").run, part, scale=SCALE)


def test_b05_gridsize(benchmark, load_job):
    _one(benchmark, load_job("table05_gridsize").run, scale=SCALE, w=W)


def test_b06_gridstar(benchmark, load_job):
    _one(benchmark, load_job("table06_gridstar").run, scale=SCALE, w=W)


def test_b07_iejoin(benchmark, load_job):
    _one(benchmark, load_job("table07_iejoin").run, scale=SCALE, w=W)


def test_b08_beta_ratio(benchmark, load_job):
    _one(benchmark, load_job("table08_beta_ratio").run, scale=SCALE, w=W)


def test_b09_symmetric(benchmark, load_job):
    _one(benchmark, load_job("table09_symmetric").run, scale=SCALE, w=W)


def test_b12_model_accuracy(benchmark, load_job, spark):
    _one(benchmark, load_job("table12_model_accuracy").run, scale=0.02, w=4, spark=spark)


def test_b15_dimensionality(benchmark, load_job):
    _one(benchmark, load_job("table15_dimensionality").run, scale=SCALE, w=W, dims=(1, 2, 4))


def test_b16_ptf(benchmark, load_job):
    _one(benchmark, load_job("table16_ptf").run, scale=0.01, w=W)
