"""Φ_LRSM — matching predictors over the matching matrix.

Matching predictors quantify match quality *without* a reference match
(Sagi & Gal [38]; used as learning features by LRSM [16]). Feature names
follow Table IV: ``dom``, ``bpm``, ``bbm``, ``normsinf`` …, ``pca1``,
``pca2``. Each matcher's matrix is at most 142 x 46, so the matrix-level
math (dominants, norms, SVD) runs per matcher inside ``applyInPandas``.

Precision-leaning predictors: dominants/mass concentration (dom, bpm,
bbm, maxRowAvg, pca1/pca2 — diversity/uncertainty). Recall-leaning
predictors: coverage and norm/entropy-style uncertainty quantities
(covRows, covCols, norms*, entropy, stdev), per §III-A ("predictors that
capture negative characteristics such as uncertainty, diversity, and
variability … correlate with recall").
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import types as T

from repro.core.matrix import history_to_matrix

__all__ = ["lrsm_features", "predictor_vector", "LRSM_FEATURES"]

LRSM_FEATURES = [
    "lrsm_dom",
    "lrsm_bpm",
    "lrsm_bbm",
    "lrsm_mcd",
    "lrsm_stdev",
    "lrsm_maxRowAvg",
    "lrsm_norms1",
    "lrsm_norms2",
    "lrsm_normsinf",
    "lrsm_normfro",
    "lrsm_pca1",
    "lrsm_pca2",
    "lrsm_covRows",
    "lrsm_covCols",
    "lrsm_entropy",
    "lrsm_nEntries",
]


def predictor_vector(entries: pd.DataFrame, n_rows: int, n_cols: int) -> dict[str, float]:
    """All predictors for one matcher's matrix given as sparse entries.

    ``entries`` has columns row_i, col_j, conf (the non-zero entries).
    """
    M = np.zeros((n_rows, n_cols))
    r = entries["row_i"].to_numpy(dtype=int)
    c = entries["col_j"].to_numpy(dtype=int)
    v = entries["conf"].to_numpy(dtype=float)
    M[r, c] = v  # Eq. 1 already deduplicated entries upstream

    nz = v[v > 0]
    n_entries = int(nz.size)
    if n_entries == 0:
        return {f: 0.0 for f in [x.removeprefix("lrsm_") for x in LRSM_FEATURES]}

    row_max = M.max(axis=1)
    col_max = M.max(axis=0)
    # dominant entries: maximal in both their row and their column
    dom_mask = (M > 0) & (M == row_max[:, None]) & (M == col_max[None, :])
    dom = float(dom_mask.sum() / n_entries)
    total_mass = float(M.sum())
    bpm = float(M[dom_mask].sum() / total_mass) if total_mass > 0 else 0.0
    active_rows = row_max > 0
    bbm = float(row_max[active_rows].mean()) if active_rows.any() else 0.0

    # norm family (uncertainty/variability → recall-leaning)
    norms1 = float(np.abs(M).sum(axis=0).max())
    normsinf = float(np.abs(M).sum(axis=1).max())
    normfro = float(np.linalg.norm(M, "fro"))
    sv = np.linalg.svd(M, compute_uv=False)
    norms2 = float(sv[0]) if sv.size else 0.0
    sq = sv**2
    tot = float(sq.sum())
    pca1 = float(sq[0] / tot) if tot > 0 and sq.size > 0 else 0.0
    pca2 = float(sq[1] / tot) if tot > 0 and sq.size > 1 else 0.0

    p = nz / nz.sum()
    entropy = float(-(p * np.log(p + 1e-12)).sum())

    return {
        "dom": dom,
        "bpm": bpm,
        "bbm": bbm,
        "mcd": float(nz.mean()),
        "stdev": float(nz.std()),
        "maxRowAvg": float(row_max[active_rows].max()) if active_rows.any() else 0.0,
        "norms1": norms1,
        "norms2": norms2,
        "normsinf": normsinf,
        "normfro": normfro,
        "pca1": pca1,
        "pca2": pca2,
        "covRows": float(active_rows.mean()),
        "covCols": float((col_max > 0).mean()),
        "entropy": entropy,
        "nEntries": float(n_entries),
    }


def _schema() -> T.StructType:
    fields = [
        T.StructField("matcher_id", T.StringType()),
        T.StructField("task", T.StringType()),
    ]
    fields += [T.StructField(f, T.DoubleType()) for f in LRSM_FEATURES]
    return T.StructType(fields)


def lrsm_features(decisions: DataFrame, task_dims: dict[str, tuple[int, int]]) -> DataFrame:
    """Per-matcher Φ_LRSM frame keyed by (matcher_id, task).

    ``task_dims`` maps task name → (n_rows, n_cols); it is captured in
    the UDF closure (a few entries, cheap to serialize).
    """
    matrix = history_to_matrix(decisions)

    def _per_matcher(pdf: pd.DataFrame) -> pd.DataFrame:
        mid = pdf["matcher_id"].iloc[0]
        task = pdf["task"].iloc[0]
        n_rows, n_cols = task_dims[task]
        vec = predictor_vector(pdf, n_rows, n_cols)
        row = {"matcher_id": mid, "task": task}
        row.update({f"lrsm_{k}": v for k, v in vec.items()})
        return pd.DataFrame([row])

    return matrix.groupBy("matcher_id", "task").applyInPandas(_per_matcher, schema=_schema())
