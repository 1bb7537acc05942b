"""Eqs. 2–5 measures, §IV-A preprocessing, and label thresholds."""
import numpy as np
import pandas as pd
import pytest

from repro.core.measures import (
    LABELS,
    attach_labels,
    cognitive_thresholds,
    matcher_measures,
    matrix_with_correctness,
    preprocess_history,
)
from repro.humansim import build_cohort


@pytest.fixture(scope="module")
def example1(spark):
    """Paper Example 1: Table I history + reference {M11, M12, M23, M34}."""
    hist = pd.DataFrame(
        [
            ("h", "PO", 0, 3, 4, 1.0, 3.0),
            ("h", "PO", 1, 1, 1, 0.9, 8.0),
            ("h", "PO", 2, 1, 2, 0.5, 15.0),
            ("h", "PO", 3, 1, 1, 0.5, 16.0),
            ("h", "PO", 4, 2, 1, 0.45, 34.0),
        ],
        columns=["matcher_id", "task", "step", "row_i", "col_j", "conf", "t"],
    )
    ref = pd.DataFrame(
        [("PO", 1, 1, 0.1), ("PO", 1, 2, 0.1), ("PO", 2, 3, 0.1), ("PO", 3, 4, 0.1)],
        columns=["task", "row_i", "col_j", "difficulty"],
    )
    return spark.createDataFrame(hist), spark.createDataFrame(ref)


class TestExample1:
    def test_precision_recall(self, spark, example1):
        hist, ref = example1
        m = matcher_measures(spark, hist, ref).toPandas().iloc[0]
        # P(H_exp) = 3/4, R(H_exp) = 3/4 (paper, Example 1 continued)
        assert m["P"] == pytest.approx(0.75)
        assert m["R"] == pytest.approx(0.75)

    def test_resolution_is_one_insignificant(self, spark, example1):
        hist, ref = example1
        m = matcher_measures(spark, hist, ref, n_perm=400).toPandas().iloc[0]
        # paper: resolution 1.0 with p_val ~ 0.5 → NOT correlated
        assert m["res"] == pytest.approx(1.0)
        assert m["res_pval"] > 0.05

    def test_calibration_underconfident(self, spark, example1):
        hist, ref = example1
        m = matcher_measures(spark, hist, ref).toPandas().iloc[0]
        # mean history confidence = 0.67; Cal = 0.67 - 0.75 = -0.08
        # (the paper's prose says "-0.12", an arithmetic slip; the sign
        # and the under-confidence conclusion are what matters)
        assert m["conf_mean"] == pytest.approx(0.67)
        assert m["cal"] == pytest.approx(0.67 - 0.75)

    def test_labels_from_example(self, spark, example1):
        hist, ref = example1
        m = matcher_measures(spark, hist, ref, n_perm=400).toPandas()
        lab = attach_labels(m, delta_res=0.5, delta_cal=0.205).iloc[0]
        assert lab["E_P"] == 1 and lab["E_R"] == 1
        assert lab["E_Res"] == 0  # res=1.0 but p > .05
        assert lab["E_Cal"] == 1  # |−0.08| < 0.205


class TestMatrixWithCorrectness:
    def test_correct_flags(self, spark, example1):
        hist, ref = example1
        mwc = matrix_with_correctness(hist, ref).toPandas()
        flags = {(r.row_i, r.col_j): r.correct for r in mwc.itertuples()}
        assert flags == {(3, 4): 1.0, (1, 1): 1.0, (1, 2): 1.0, (2, 1): 0.0}


class TestPreprocess:
    def test_drops_first_three(self, spark):
        hist = pd.DataFrame(
            [("a", "PO", i, i, 0, 0.5, float(i * 10)) for i in range(6)],
            columns=["matcher_id", "task", "step", "row_i", "col_j", "conf", "t"],
        )
        out = preprocess_history(spark.createDataFrame(hist)).toPandas()
        assert sorted(out["step"]) == [3, 4, 5]

    def test_drops_time_outlier(self, spark):
        # gaps: nine 10s gaps and one 500s pause → pause row dropped
        ts, t = [], 0.0
        for i in range(11):
            ts.append(t)
            t += 500.0 if i == 7 else 10.0
        hist = pd.DataFrame(
            [("a", "PO", i, i, 0, 0.5, ts[i]) for i in range(11)],
            columns=["matcher_id", "task", "step", "row_i", "col_j", "conf", "t"],
        )
        out = preprocess_history(spark.createDataFrame(hist), warmup_drop=0).toPandas()
        assert 8 not in out["step"].tolist()  # the decision after the pause
        assert len(out) == 10

    def test_schema_preserved(self, spark):
        c = build_cohort("PO", n_matchers=3, seed=0)
        df = spark.createDataFrame(c.decisions)
        out = preprocess_history(df)
        assert out.columns == df.columns

    def test_short_history_survives(self, spark):
        hist = pd.DataFrame(
            [("a", "PO", 0, 0, 0, 0.5, 1.0)],
            columns=["matcher_id", "task", "step", "row_i", "col_j", "conf", "t"],
        )
        out = preprocess_history(spark.createDataFrame(hist)).toPandas()
        assert len(out) == 0  # single decision falls inside warm-up drop


class TestCohortMeasures:
    @pytest.fixture(scope="class")
    def measures(self, spark):
        c = build_cohort("PO", n_matchers=12, seed=0)
        m = matcher_measures(
            spark,
            spark.createDataFrame(c.decisions),
            spark.createDataFrame(c.reference_df()),
            n_perm=50,
        ).toPandas()
        return c, m

    def test_one_row_per_matcher(self, measures):
        c, m = measures
        assert sorted(m["matcher_id"]) == sorted(c.matcher_ids)

    def test_ranges(self, measures):
        _, m = measures
        assert ((m["P"] >= 0) & (m["P"] <= 1)).all()
        assert ((m["R"] >= 0) & (m["R"] <= 1)).all()
        assert ((m["res"] >= -1) & (m["res"] <= 1)).all()
        assert ((m["res_pval"] > 0) & (m["res_pval"] <= 1)).all()
        assert ((m["cal"] >= -1) & (m["cal"] <= 1)).all()

    def test_matches_pandas_reference_impl(self, measures):
        """Spark pipeline vs a direct pandas computation of P and R."""
        c, m = measures
        ref = set(c.task.reference_pairs)
        for _, row in m.iterrows():
            g = c.decisions[c.decisions.matcher_id == row.matcher_id]
            last = g.sort_values(["t", "step"]).groupby(["row_i", "col_j"]).tail(1)
            correct = np.array([(r, cj) in ref for r, cj in zip(last.row_i, last.col_j)])
            assert row["P"] == pytest.approx(correct.mean())
            assert row["R"] == pytest.approx(correct.sum() / len(ref))
            assert row["cal"] == pytest.approx(g.conf.mean() - correct.mean())

    def test_skill_drives_precision(self, spark):
        """Sanity: measured P correlates with the latent skill trait."""
        c = build_cohort("PO", n_matchers=30, seed=1)
        m = matcher_measures(
            spark,
            spark.createDataFrame(c.decisions),
            spark.createDataFrame(c.reference_df()),
            n_perm=20,
        ).toPandas()
        j = m.merge(c.matchers[["matcher_id", "trait_skill"]], on="matcher_id")
        assert j["P"].corr(j["trait_skill"]) > 0.6


class TestThresholdsAndLabels:
    def test_thresholds_are_percentiles(self):
        m = pd.DataFrame({"res": np.linspace(-1, 1, 101), "cal": np.linspace(-0.5, 0.5, 101)})
        d_res, d_cal = cognitive_thresholds(m)
        assert d_res == pytest.approx(np.quantile(m["res"], 0.8))
        assert d_cal == pytest.approx(np.quantile(m["cal"], 0.2))

    def test_attach_labels_columns(self):
        m = pd.DataFrame(
            {"P": [0.6, 0.4], "R": [0.6, 0.2], "res": [0.9, 0.1],
             "res_pval": [0.01, 0.5], "cal": [0.05, 0.4]}
        )
        lab = attach_labels(m, delta_res=0.5, delta_cal=0.2)
        assert LABELS == ["E_P", "E_R", "E_Res", "E_Cal"]
        assert lab[LABELS].values.tolist() == [[1, 1, 1, 1], [0, 0, 0, 0]]

    def test_significance_gates_correlation(self):
        m = pd.DataFrame({"P": [0.9], "R": [0.9], "res": [0.99], "res_pval": [0.2], "cal": [0.0]})
        lab = attach_labels(m, delta_res=0.5, delta_cal=0.2)
        assert lab["E_Res"].iloc[0] == 0

    def test_calibration_uses_absolute_value(self):
        m = pd.DataFrame({"P": [0.5, 0.5], "R": [0.5, 0.5], "res": [0, 0],
                          "res_pval": [1, 1], "cal": [-0.1, 0.1]})
        lab = attach_labels(m, delta_res=0.5, delta_cal=0.2)
        assert lab["E_Cal"].tolist() == [1, 1]
