"""Run every experiment at full scale and save the tables to results/.

This is the EXPERIMENTS.md generator: one shared PO experiment feeds
Tables IIa, III, IV and the utilization analysis; Table IIb and the
population table run separately. ~15-25 min on 16 cores.
"""
from __future__ import annotations

import sys
import time
from pathlib import Path

ROOT = Path(__file__).resolve().parent.parent
sys.path.insert(0, str(ROOT / "jobs"))
sys.path.insert(0, str(ROOT / "src"))
from _common import get_spark  # noqa: E402


def main() -> None:
    out = ROOT / "results"
    out.mkdir(exist_ok=True)
    spark = get_spark("run-all-experiments")
    from repro.experiments import (
        population_tables,
        run_po_experiment,
        table2a,
        table2b,
        table3,
        table4,
        utilization_tables,
    )

    t0 = time.time()

    def log(msg: str) -> None:
        print(f"[{time.time() - t0:7.1f}s] {msg}", flush=True)

    log("PO experiment (5-fold, 106 matchers) ...")
    exp = run_po_experiment(spark, seed=0, n_perm=100)
    log("PO experiment done")

    t2a = table2a(exp)
    t2a.round(3).to_csv(out / "table2a.csv", index=False)
    log("table2a:\n" + t2a.round(2).to_string(index=False))

    t3 = table3(exp)
    t3.round(3).to_csv(out / "table3.csv", index=False)
    log("table3:\n" + t3.round(2).to_string(index=False))

    t4 = table4(exp)
    t4.round(4).to_csv(out / "table4.csv", index=False)
    log("table4:\n" + t4.round(4).to_string(index=False))

    ut = utilization_tables(spark, exp, early_limit=30)
    for name, df in ut.items():
        df.round(3).to_csv(out / f"utilize_{name}.csv", index=False)
        log(f"utilize {name}:\n" + df.round(2).to_string(index=False))

    log("Table IIb (train PO -> test OAEI) ...")
    t2b = table2b(spark, seed=0, n_perm=100)
    t2b.round(3).to_csv(out / "table2b.csv", index=False)
    log("table2b:\n" + t2b.round(2).to_string(index=False))

    pop = population_tables(spark, seed=0, n_perm=100)
    pop.round(3).to_csv(out / "population.csv", index=False)
    log("population:\n" + pop.round(3).to_string(index=False))

    log("all done")
    spark.stop()


if __name__ == "__main__":
    main()
