"""The seven baselines of §IV-B2.

- ``Rand`` — uniform random labels.
- ``Rand_Freq`` — labels drawn with the training-set label frequencies.
- ``Conf`` — trust self-reported confidence [31]: a matcher is an expert
  (all four labels) iff her mean reported confidence exceeds the train
  median.
- ``Qual. Test`` — the warm-up phase as qualification test [45]: expert
  iff warm-up precision > 0.5.
- ``Self-Assess`` — Gadiraju-style pre-selection [14]: expert iff
  warm-up |Cal| < 0.2 and warm-up P > 0.6 (the paper's exact rule).
- ``LRSM`` [16] — learned classifier over Φ_LRSM only.
- ``BEH`` [19] — learned classifier over the aggregated behavioral
  feature sets (Φ_Beh + Φ_Mou).

The learning-based baselines reuse the MExI trainer restricted to the
relevant feature sets (no sub-matchers, no networks), which also makes
them exactly the ``include``-rows of the Table III ablation.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core.measures import LABELS
from repro.core.mexi import NNParams, PreparedData, train_mexi

__all__ = ["BASELINE_NAMES", "baseline_predictions"]

BASELINE_NAMES = ["Rand", "Rand_Freq", "Conf", "Qual. Test", "Self-Assess", "LRSM", "BEH"]


def _uniform(ids: list[str], rng: np.random.Generator) -> pd.DataFrame:
    out = pd.DataFrame({"matcher_id": ids})
    for lab in LABELS:
        out[lab] = rng.integers(0, 2, len(ids))
    return out


def _freq(ids: list[str], train_labels: pd.DataFrame, rng: np.random.Generator) -> pd.DataFrame:
    out = pd.DataFrame({"matcher_id": ids})
    for lab in LABELS:
        p = float(train_labels[lab].mean())
        out[lab] = (rng.random(len(ids)) < p).astype(int)
    return out


def _all_same(ids: list[str], expert: pd.Series) -> pd.DataFrame:
    out = pd.DataFrame({"matcher_id": ids})
    bit = expert.reindex(ids).fillna(0).astype(int).to_numpy()
    for lab in LABELS:
        out[lab] = bit
    return out


def baseline_predictions(
    data: PreparedData,
    train_ids: list[str],
    test_ids: list[str],
    train_labels: pd.DataFrame,
    *,
    seed: int = 0,
    test_data: PreparedData | None = None,
) -> dict[str, pd.DataFrame]:
    """Predictions of all seven baselines for ``test_ids``.

    ``train_labels`` are the ground-truth labels of the train fold
    (computed by the caller with train-fold thresholds). ``test_data``
    supports cross-cohort testing (Table IIb): test matchers' measures,
    warm-up phase and features come from that bundle, while everything
    learned (frequencies, medians, classifiers) comes from ``data``.
    """
    test_data = test_data or data
    rng = np.random.default_rng(seed)
    train_meas = data.measures.set_index("matcher_id")
    test_meas = test_data.measures.set_index("matcher_id")
    warm = test_data.warmup_measures.set_index("matcher_id")

    out: dict[str, pd.DataFrame] = {}
    out["Rand"] = _uniform(test_ids, rng)
    out["Rand_Freq"] = _freq(test_ids, train_labels, rng)

    conf_median = float(train_meas.loc[train_ids, "conf_mean"].median())
    out["Conf"] = _all_same(test_ids, test_meas["conf_mean"] > conf_median)
    out["Qual. Test"] = _all_same(test_ids, warm["P"] > 0.5)
    out["Self-Assess"] = _all_same(
        test_ids, (warm["P"] > 0.6) & (warm["cal"].abs() < 0.2)
    )

    for name, sets in [("LRSM", ("LRSM",)), ("BEH", ("Beh", "Mou"))]:
        model = train_mexi(
            data, train_ids, submatcher="none", include_sets=sets, nn=NNParams(), seed=seed
        )
        out[name] = (
            model.predict(test_ids)
            if test_data is data
            else model.predict_on(test_data, test_ids)
        )
    return out
