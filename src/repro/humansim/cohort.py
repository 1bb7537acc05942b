"""Cohort builder: the two matcher populations of §IV-A.

- PO cohort: 106 matchers on the Purchase-Order task (train/eval via
  5-fold CV — Table IIa).
- OAEI cohort: 34 matchers on the ontology-alignment task with a
  negative trait shift (domain shift for the generalizability test —
  Table IIb).

Each matcher additionally completes the short Thalia warm-up task
(qualification phase used by the Qual.Test / Self-Assess baselines) and
self-reports personal information (used only for the population analysis
of §IV-C, mirroring the paper: psychometric score correlates with the
precision-driving trait, English level with the coverage trait).

The latent ``Traits`` are stored for diagnostics but are *never* visible
to MExI or the baselines — labels come from measured behavior (Eqs. 2–5).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.humansim.matcher_gen import Traits, generate_matcher, sample_traits
from repro.humansim.schema_gen import MatchingTask, make_task

__all__ = ["Cohort", "build_cohort", "PO_N_MATCHERS", "OAEI_N_MATCHERS"]

PO_N_MATCHERS = 106
OAEI_N_MATCHERS = 34


@dataclass
class Cohort:
    """All frames for one matcher population (pandas; Spark-ified by callers)."""

    kind: str
    task: MatchingTask
    warmup_task: MatchingTask
    decisions: pd.DataFrame  # main-task history H (long format)
    mouse: pd.DataFrame  # main-task movement map G (long format)
    warmup_decisions: pd.DataFrame  # Thalia qualification phase
    matchers: pd.DataFrame  # ids + personal info + latent traits (diagnostics)

    @property
    def matcher_ids(self) -> list[str]:
        return self.matchers["matcher_id"].tolist()

    def reference_df(self) -> pd.DataFrame:
        return self.task.reference_df()

    def warmup_reference_df(self) -> pd.DataFrame:
        return self.warmup_task.reference_df()


def _personal_info(rng: np.random.Generator, traits: Traits) -> dict:
    """Self-reported info mirroring §IV-A / §IV-C correlations."""
    psychometric = float(np.clip(rng.normal(678 + 60 * (traits.skill - 0.5), 45), 400, 800))
    english = int(np.clip(round(2.2 + 2.6 * traits.coverage + rng.normal(0, 0.7)), 1, 5))
    domain = int(np.clip(round(1 + rng.exponential(0.35)), 1, 5))
    return {
        "gender": str(rng.choice(["f", "m", "other"], p=[0.45, 0.52, 0.03])),
        "age": int(rng.integers(20, 30)),
        "psychometric": psychometric,
        "english": english,
        "domain_knowledge": domain,
        "db_education": 1,
    }


def build_cohort(kind: str, *, n_matchers: int | None = None, seed: int = 0) -> Cohort:
    """Generate a full cohort; deterministic in (kind, n_matchers, seed)."""
    if kind not in ("PO", "OAEI"):
        raise ValueError(f"kind must be 'PO' or 'OAEI', got {kind!r}")
    if n_matchers is None:
        n_matchers = PO_N_MATCHERS if kind == "PO" else OAEI_N_MATCHERS
    shift = 0.0 if kind == "PO" else -0.06
    task = make_task(kind, seed=seed)
    warmup_task = make_task("THALIA", seed=seed)
    rng = np.random.default_rng(seed + (0 if kind == "PO" else 7919))

    dec_frames, mouse_frames, warm_frames, rows = [], [], [], []
    for n in range(n_matchers):
        mid = f"{kind.lower()}_{n:03d}"
        traits = sample_traits(rng, shift=shift)
        mseed = int(rng.integers(0, 2**31 - 1))
        ddf, mdf = generate_matcher(mid, task, traits, seed=mseed)
        wdf, _ = generate_matcher(
            mid, warmup_task, traits, seed=mseed + 1, n_decisions=int(rng.integers(8, 13))
        )
        dec_frames.append(ddf)
        mouse_frames.append(mdf)
        warm_frames.append(wdf)
        rows.append(
            {
                "matcher_id": mid,
                "task": task.name,
                **_personal_info(rng, traits),
                # latent traits — diagnostics only, never model input
                "trait_skill": traits.skill,
                "trait_coverage": traits.coverage,
                "trait_metacog": traits.metacog,
                "trait_bias": traits.bias,
                "trait_deliberate": traits.deliberate,
            }
        )
    return Cohort(
        kind=kind,
        task=task,
        warmup_task=warmup_task,
        decisions=pd.concat(dec_frames, ignore_index=True),
        mouse=pd.concat(mouse_frames, ignore_index=True),
        warmup_decisions=pd.concat(warm_frames, ignore_index=True),
        matchers=pd.DataFrame(rows),
    )
