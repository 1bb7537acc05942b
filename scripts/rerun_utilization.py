"""Recompute only the §IV-F utilization tables (results/utilize_*.csv).

Used after changes that affect only the utilization path (e.g. the
early-identification retraining); rebuilds the PO experiment with the
same seed so selections match the main run.
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
    spark = get_spark("rerun-utilization")
    from repro.experiments import run_po_experiment, utilization_tables

    t0 = time.time()
    exp = run_po_experiment(spark, seed=0, n_perm=100)
    print(f"[{time.time()-t0:.1f}s] experiment rebuilt", flush=True)
    ut = utilization_tables(spark, exp, early_limit=30)
    for name, df in ut.items():
        df.round(3).to_csv(out / f"utilize_{name}.csv", index=False)
        print(f"utilize {name}:\n" + df.round(2).to_string(index=False), flush=True)
    print(f"[{time.time()-t0:.1f}s] done", flush=True)
    spark.stop()


if __name__ == "__main__":
    main()
