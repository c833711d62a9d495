"""Table V benchmark: one dataset_row per benchmark (tiny scale), i.e.
the full mask -> impute-with-every-method -> RMS pipeline that produces
a row of Table V. `jobs/table_v.py --scale full` regenerates the real
table; this tracks the harness cost shape per dataset regime.
"""
import pytest

from repro.eval.harness import SCALES, dataset_row

#: a representative method per family keeps the benchmark meaningful
#: but bounded: IIM (ours), kNN (tuple model), GLR (attribute model),
#: XGB (boosting).
BENCH_METHODS = ["IIM", "kNN", "GLR", "XGB"]


@pytest.mark.parametrize("name", ["ASF", "CA", "SN"])
def test_bench_table_v_row(benchmark, spark, name):
    n = SCALES["tiny"][name]

    def run():
        return dataset_row(
            spark, name, methods=BENCH_METHODS, n=n, frac=0.05, seed=0
        )

    row = benchmark.pedantic(run, rounds=2, iterations=1, warmup_rounds=1)
    assert isinstance(row["IIM"], float)
