"""Table VI benchmark: the per-missing-attribute ASF sweep (tiny scale,
two representative attributes). `jobs/table_vi.py --scale full`
regenerates the table itself."""
import pytest

from repro.eval.harness import SCALES, dataset_row


@pytest.mark.parametrize("attr", ["A1", "A5"])
def test_bench_table_vi_attr(benchmark, spark, attr):
    n = SCALES["tiny"]["ASF"]

    def run():
        return dataset_row(
            spark,
            "ASF",
            methods=["IIM", "kNN", "GLR", "LOESS"],
            n=n,
            frac=None,
            count=12,
            fixed_attr=attr,
            seed=0,
        )

    row = benchmark.pedantic(run, rounds=2, iterations=1, warmup_rounds=1)
    assert isinstance(row["IIM"], float)
