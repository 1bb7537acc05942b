"""Eq. 1: decision history → matching matrix (latest confidence wins)."""
import pandas as pd
import pytest

from repro.core.matrix import history_to_matrix
from repro.oracle import assert_equivalent


def _hist(spark, rows):
    pdf = pd.DataFrame(rows, columns=["matcher_id", "task", "step", "row_i", "col_j", "conf", "t"])
    return spark.createDataFrame(pdf), pdf


@pytest.fixture(scope="module")
def table1(spark):
    """The paper's Table I history (Example 1): M34, M11, M12, M11, M21."""
    rows = [
        ("h", "PO", 0, 3, 4, 1.0, 3.0),
        ("h", "PO", 1, 1, 1, 0.9, 8.0),
        ("h", "PO", 2, 1, 2, 0.5, 15.0),
        ("h", "PO", 3, 1, 1, 0.5, 16.0),
        ("h", "PO", 4, 2, 1, 0.45, 34.0),
    ]
    return _hist(spark, rows)


def test_table1_matrix(spark, table1):
    df, _ = table1
    got = {
        (r.row_i, r.col_j): r.conf
        for r in history_to_matrix(df).collect()
    }
    # Example 1 (continued): M11 revisited at t=16 and lowered to 0.5.
    assert got == {(3, 4): 1.0, (1, 1): 0.5, (1, 2): 0.5, (2, 1): 0.45}


def test_table1_matrix_oracle(spark, table1):
    df, pdf = table1
    assert_equivalent(
        history_to_matrix(df),
        """
        SELECT matcher_id, task, row_i, col_j, conf FROM (
          SELECT *, row_number() OVER (
            PARTITION BY matcher_id, task, row_i, col_j
            ORDER BY t DESC, step DESC) AS rn
          FROM h
        ) WHERE rn = 1
        """,
        h=pdf,
    )


def test_latest_wins_regardless_of_row_order(spark):
    rows = [
        ("a", "PO", 1, 0, 0, 0.9, 10.0),
        ("a", "PO", 0, 0, 0, 0.2, 99.0),  # later timestamp, earlier step
    ]
    df, _ = _hist(spark, rows)
    [(conf,)] = history_to_matrix(df).select("conf").collect()
    assert conf == 0.2


def test_tie_broken_by_step(spark):
    rows = [
        ("a", "PO", 0, 0, 0, 0.1, 5.0),
        ("a", "PO", 1, 0, 0, 0.8, 5.0),  # same t, higher step wins
    ]
    df, _ = _hist(spark, rows)
    [(conf,)] = history_to_matrix(df).select("conf").collect()
    assert conf == 0.8


def test_matchers_independent(spark):
    rows = [
        ("a", "PO", 0, 0, 0, 0.3, 1.0),
        ("b", "PO", 0, 0, 0, 0.7, 2.0),
    ]
    df, _ = _hist(spark, rows)
    got = {r.matcher_id: r.conf for r in history_to_matrix(df).collect()}
    assert got == {"a": 0.3, "b": 0.7}


def test_tasks_independent(spark):
    rows = [
        ("a", "PO", 0, 0, 0, 0.3, 1.0),
        ("a", "OAEI", 0, 0, 0, 0.7, 2.0),
    ]
    df, _ = _hist(spark, rows)
    got = {r.task: r.conf for r in history_to_matrix(df).collect()}
    assert got == {"PO": 0.3, "OAEI": 0.7}


def test_cohort_matrix_oracle(spark):
    """Eq. 1 over a full generated cohort slice vs DuckDB."""
    from repro.humansim import build_cohort

    c = build_cohort("PO", n_matchers=6, seed=3)
    df = spark.createDataFrame(c.decisions)
    assert_equivalent(
        history_to_matrix(df),
        """
        SELECT matcher_id, task, row_i, col_j, conf FROM (
          SELECT *, row_number() OVER (
            PARTITION BY matcher_id, task, row_i, col_j
            ORDER BY t DESC, step DESC) AS rn
          FROM h
        ) WHERE rn = 1
        """,
        h=c.decisions,
    )


def test_matrix_size_leq_history(spark):
    from repro.humansim import build_cohort

    c = build_cohort("PO", n_matchers=4, seed=1)
    df = spark.createDataFrame(c.decisions)
    n_matrix = history_to_matrix(df).count()
    assert n_matrix <= len(c.decisions)
    # distinct pairs == matrix entries
    assert n_matrix == c.decisions.groupby(["matcher_id", "row_i", "col_j"]).ngroups
