"""§IV-C / Figs. 8-9 — population characterization of both cohorts.

Mean measure values, positive-resolution / under-confident subgroup
means, and expert-type proportions.

Run: ``spark-submit jobs/population_stats.py``.
"""
from __future__ import annotations

import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import get_spark  # noqa: E402


def main() -> None:
    spark = get_spark("population-stats")
    from repro.experiments import population_tables

    t = population_tables(spark, seed=0, n_perm=100)
    print("\nPopulation characterization (Figs. 8-9 as a table):")
    print(t.round(3).to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
