"""Table I worked example (Example 1): history → matrix → measures.

Prints the paper's Table I, the derived matching matrix (Eq. 1), and the
resulting measures (P = R = 3/4, Res = 1.0 with insignificant p-value,
under-confident calibration), matching §II's worked example.

Run: ``spark-submit jobs/table1_example.py`` (or plain ``python``).
"""
from __future__ import annotations

import sys
from pathlib import Path

import pandas as pd

sys.path.insert(0, str(Path(__file__).parent))
from _common import get_spark  # noqa: E402


def main() -> None:
    spark = get_spark("table1-example")
    from repro.core.matrix import history_to_matrix
    from repro.core.measures import matcher_measures

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
    print("Table I (decision history):")
    print(hist.to_string(index=False))
    print("\nMatching matrix entries (Eq. 1, latest confidence wins):")
    print(history_to_matrix(spark.createDataFrame(hist)).toPandas().to_string(index=False))
    print("\nMeasures (Eqs. 2-5):")
    m = matcher_measures(
        spark, spark.createDataFrame(hist), spark.createDataFrame(ref), n_perm=400
    ).toPandas()
    print(m.round(3).to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
