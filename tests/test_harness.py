"""End-to-end experiment harness (Tables V / VI) at tiny scale."""
import numpy as np
import pandas as pd
import pytest

from repro.eval import harness
from repro.oracle import assert_equivalent

FAST_METHODS = ["IIM", "Mean", "kNN", "GLR", "LOESS"]


@pytest.fixture(scope="module")
def asf_exp(spark):
    return harness.prepare_experiment(spark, "ASF", n=250, frac=0.06, seed=0)


class TestPrepare:
    def test_partition_sizes(self, spark, asf_exp):
        n_missing = len(asf_exp.truth)
        assert n_missing == 15  # 6% of 250
        n_complete = asf_exp.complete.count()
        assert n_complete == 250 - asf_exp.truth["row_id"].nunique()

    def test_groups_cover_truth(self, asf_exp):
        group_attrs = {g.A_x for g in asf_exp.groups}
        assert group_attrs == set(asf_exp.truth["attr"].unique())
        total = sum(g.incomplete.count() for g in asf_exp.groups)
        assert total == len(asf_exp.truth)

    def test_groups_have_complement_features(self, asf_exp):
        for g in asf_exp.groups:
            assert g.A_x not in g.F
            assert len(g.F) == 5

    def test_complete_relation_has_no_nulls(self, spark, asf_exp):
        pdf = asf_exp.complete.toPandas()
        assert not pdf.isna().any().any()

    def test_fixed_attr_single_group(self, spark):
        exp = harness.prepare_experiment(
            spark, "CCS", n=150, frac=None, count=12, fixed_attr="A2", seed=1
        )
        assert len(exp.groups) == 1 and exp.groups[0].A_x == "A2"

    def test_complete_count_oracle(self, spark, asf_exp):
        """Catalyst aggregation over the complete relation matches DuckDB."""
        out = asf_exp.complete.groupBy().count().withColumnRenamed("count", "n")
        assert_equivalent(
            out, "SELECT COUNT(*) AS n FROM r", r=asf_exp.complete.toPandas()
        )


class TestImputeAndScore:
    def test_every_fast_method_scores(self, spark, asf_exp):
        for m in FAST_METHODS:
            res = harness.impute_with(spark, asf_exp, m, **({"k": 5} if m in ("kNN", "IIM") else {}))
            s = harness.score(asf_exp, res)
            assert np.isfinite(s) and s >= 0

    def test_score_raises_on_partial_result(self, asf_exp):
        partial = pd.DataFrame(
            {
                "row_id": [asf_exp.truth["row_id"].iloc[0]],
                "attr": [asf_exp.truth["attr"].iloc[0]],
                "imputed": [0.0],
            }
        )
        if len(asf_exp.truth) > 1:
            with pytest.raises(AssertionError):
                harness.score(asf_exp, partial)

    def test_multivariate_unavailable_on_sn(self, spark):
        exp = harness.prepare_experiment(spark, "SN", n=150, frac=0.05, seed=0)
        assert harness.impute_with(spark, exp, "SVD") is None
        assert harness.impute_with(spark, exp, "ILLS") is None
        assert harness.impute_with(spark, exp, "XGB") is None
        exp.complete.unpersist()

    def test_perfect_imputation_scores_zero(self, asf_exp):
        fake = asf_exp.truth.rename(columns={"truth": "imputed"})
        assert harness.score(asf_exp, fake) == 0.0


class TestDatasetRow:
    def test_row_structure_and_ordering(self, spark):
        row = harness.dataset_row(
            spark, "ASF", methods=FAST_METHODS, n=220, frac=0.06, seed=0
        )
        assert row["Dataset"] == "ASF"
        assert {"R2_S", "R2_H"} <= set(row)
        for m in FAST_METHODS:
            assert isinstance(row[m], float)
        # the paper's headline claim at tiny scale: IIM <= kNN and GLR
        assert row["IIM"] <= row["kNN"]
        assert row["IIM"] <= row["GLR"]

    def test_sn_reports_dashes(self, spark):
        row = harness.dataset_row(
            spark, "SN", methods=["IIM", "kNN", "SVD", "XGB"], n=200, frac=0.05, seed=0
        )
        assert row["SVD"] == "-" and row["XGB"] == "-"
        assert isinstance(row["IIM"], float)


class TestTableBuilders:
    def test_table_v_tiny(self, spark):
        t = harness.table_v(
            spark, scale="tiny", datasets=["ASF", "SN"], methods=["IIM", "kNN", "GLR"]
        )
        assert list(t["Dataset"]) == ["ASF", "SN"]
        assert {"IIM", "kNN", "GLR", "R2_S", "R2_H"} <= set(t.columns)

    def test_table_vi_tiny(self, spark):
        t = harness.table_vi(
            spark, scale="tiny", count=10, methods=["IIM", "kNN"]
        )
        assert list(t["A_x"]) == [f"A{j}" for j in range(1, 7)]
        assert (t["IIM"].astype(float) >= 0).all()
