"""Table VII benchmark: the clustering-purity and classification-F1
applications (tiny scale). `jobs/table_vii.py --scale full` regenerates
the table itself."""
import pytest

from repro.eval import apps


def test_bench_clustering_app(benchmark, spark):
    def run():
        return apps.clustering_app(
            spark, "ASF", methods=["Mean", "kNN", "GLR"], n=150,
            n_clusters=4, frac=0.3, seed=0,
        )

    row = benchmark.pedantic(run, rounds=2, iterations=1, warmup_rounds=1)
    assert 0 <= row["Missing"] <= 1


def test_bench_classification_app(benchmark, spark):
    def run():
        return apps.classification_app(
            spark, "MAM", methods=["Mean", "kNN"], n=120, seed=0
        )

    row = benchmark.pedantic(run, rounds=2, iterations=1, warmup_rounds=1)
    assert 0 <= row["Missing"] <= 1
