"""Table III benchmark: per-model learning cost, from-scratch vs
incremental (Proposition 3), sweeping the candidate-l grid.

The paper's claim: computing U/V from scratch is O(m^2 (l+h)) per grid
point (linear in l) while the incremental update is O(m^2 h) (constant
in l). These benchmarks measure the full candidate sweep both ways on
identical input — the incremental one must be substantially faster, and
the outputs are asserted equal.
"""
import numpy as np
import pytest

from repro.core import linalg

N, P, H = 3000, 8, 25


@pytest.fixture(scope="module")
def sweep_input():
    rng = np.random.default_rng(0)
    X = rng.normal(size=(N, P))
    y = rng.normal(size=N)
    grid = linalg.make_grid(N, H, l_max=None)
    return X, y, grid


def test_bench_scratch_sweep(benchmark, sweep_input):
    X, y, grid = sweep_input
    benchmark(linalg.prefix_params_scratch, X, y, grid)


def test_bench_incremental_sweep(benchmark, sweep_input):
    X, y, grid = sweep_input
    benchmark(linalg.prefix_params, X, y, grid)


def test_incremental_faster_and_equal(sweep_input):
    """Non-benchmark guard: same output, and the incremental sweep is at
    least 2x faster at this size (paper reports ~an order of magnitude
    for the full adaptive learning, Fig. 12)."""
    import time

    X, y, grid = sweep_input
    t0 = time.perf_counter()
    scr = linalg.prefix_params_scratch(X, y, grid)
    t_scr = time.perf_counter() - t0
    t0 = time.perf_counter()
    inc = linalg.prefix_params(X, y, grid)
    t_inc = time.perf_counter() - t0
    np.testing.assert_allclose(inc, scr, rtol=1e-6, atol=1e-8)
    assert t_inc < t_scr / 2


def test_bench_adaptive_learning_incremental(benchmark, spark):
    """End-to-end adaptive learning (Algorithm 3) wall-clock with the
    incremental candidate sweep, on a small CA sample."""
    from repro.core.adaptive import adaptive_learn
    from repro.datasets import attributes, generate

    pdf = generate("CA", n=400)
    attrs = attributes("CA")
    df = spark.createDataFrame(pdf[["row_id"] + attrs]).cache()
    df.count()

    def run():
        adaptive_learn(
            spark, df, attrs[:-1], attrs[-1], k=10, h=10, l_max=None
        ).count()

    benchmark.pedantic(run, rounds=3, iterations=1, warmup_rounds=1)
    df.unpersist()


def test_bench_adaptive_learning_scratch(benchmark, spark):
    """Same workload with the straightforward from-scratch sweep — the
    Table III / Fig. 12 comparison point."""
    from repro.core.adaptive import adaptive_learn
    from repro.datasets import attributes, generate

    pdf = generate("CA", n=400)
    attrs = attributes("CA")
    df = spark.createDataFrame(pdf[["row_id"] + attrs]).cache()
    df.count()

    def run():
        adaptive_learn(
            spark, df, attrs[:-1], attrs[-1], k=10, h=10, l_max=None,
            incremental=False,
        ).count()

    benchmark.pedantic(run, rounds=3, iterations=1, warmup_rounds=1)
    df.unpersist()
