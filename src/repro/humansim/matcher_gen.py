"""Generative model of a human matcher (decision history + mouse map).

Substitutes the paper's 140 human participants (DESIGN.md §2). A matcher
is a latent trait vector; the generator emits exactly the observable
artifacts the paper records — a decision history ``H`` of
``(element pair, confidence, timestamp)`` triples and a mouse map ``G``
of ``((x, y), event type, timestamp)`` triples. Expertise labels are
NEVER taken from the traits: they are computed downstream from the
emitted behavior via Eqs. 2–5, exactly as the paper computes them from
observed humans.

The trait → behavior couplings implement the qualitative findings the
paper reports, so that each feature family has the signal MExI exploits:

- *skill* drives correct-pair selection (→ P, and Φ_LRSM predictors);
- *coverage* drives decision count (→ R, and path length in Φ_Mou);
- *metacognition* couples confidence to correctness (→ Res), lowers
  scrolling (§IV-E: "scrolling … may indicate uncertain behavior") and
  mind-changes;
- *confidence bias* shifts reported confidence (→ Cal);
- skilled matchers visit the metadata region; weak ones avoid it
  (§I-A, Matcher B "refrained from investigating the metadata").
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.humansim.schema_gen import REGIONS, MatchingTask

__all__ = ["Traits", "sample_traits", "generate_matcher", "DECISION_COLUMNS", "MOUSE_COLUMNS"]

DECISION_COLUMNS = ["matcher_id", "task", "step", "row_i", "col_j", "conf", "t"]
MOUSE_COLUMNS = ["matcher_id", "task", "x", "y", "etype", "t"]


@dataclass(frozen=True)
class Traits:
    """Latent behavioral traits in [0, 1] (bias in [-0.35, 0.45])."""

    skill: float
    coverage: float
    metacog: float
    bias: float
    deliberate: float


def sample_traits(rng: np.random.Generator, *, shift: float = 0.0) -> Traits:
    """Draw correlated traits via a Gaussian copula.

    ``shift`` < 0 degrades the population (used for the OAEI cohort's
    domain shift: a harder, less familiar task). Marginals are tuned so
    the *measured* population matches Figs. 8–9: ~53% precise, ~15%
    thorough, ~1/3 correlated, ~40% calibrated, over-confidence on
    average.
    """
    # Correlated latent normals: skilled matchers tend to self-monitor
    # better, work more, and carry less confidence bias. skill~metacog is
    # deliberately moderate: strong enough that an all-four expert core
    # exists (Fig. 9's darkest shade), weak enough that cognitive
    # expertise is NOT readable off the matching matrix alone — the paper
    # finds mouse/sequential features, not matching predictors, carry the
    # cognitive labels (Table III).
    cov = np.array(
        [
            [1.0, 0.45, 0.50, -0.25, 0.35],
            [0.45, 1.0, 0.45, -0.15, 0.10],
            [0.50, 0.45, 1.0, -0.50, 0.25],
            [-0.25, -0.15, -0.50, 1.0, -0.10],
            [0.35, 0.10, 0.25, -0.10, 1.0],
        ]
    )
    z = rng.multivariate_normal(np.zeros(5), cov)
    u = 1.0 / (1.0 + np.exp(-z))  # squash to (0,1)
    return Traits(
        skill=float(np.clip(0.12 + 0.80 * u[0] + shift, 0.02, 0.98)),
        coverage=float(np.clip(0.10 + 0.80 * u[1] + 0.6 * shift, 0.02, 0.98)),
        metacog=float(np.clip(0.06 + 0.90 * u[2] + shift, 0.02, 0.98)),
        # positive mean → population-level over-confidence (Fig. 8)
        bias=float(np.clip(1.2 * (u[3] - 0.10), -0.35, 0.70)),
        deliberate=float(np.clip(0.10 + 0.80 * u[4], 0.02, 0.98)),
    )


def _region_point(rng: np.random.Generator, region: str) -> tuple[float, float]:
    x0, y0, x1, y1 = REGIONS[region]
    return float(rng.uniform(x0, x1)), float(rng.uniform(y0, y1))


def _emit_mouse(
    rng: np.random.Generator,
    traits: Traits,
    t0: float,
    t1: float,
    out: list[tuple[float, float, str, float]],
) -> None:
    """Mouse activity for one decision, spread over [t0, t1).

    Region mixture depends on skill (metadata attention); scroll rate on
    (1 - metacognition); a left click lands in the matrix region at the
    decision moment.
    """
    meta_w = 0.05 + 0.40 * traits.skill
    weights = np.array([0.30, 0.25, meta_w, 0.45])
    weights /= weights.sum()
    names = ["schema_left", "schema_right", "metadata", "matrix"]
    n_moves = int(rng.integers(6, 14))
    ts = np.sort(rng.uniform(t0, t1, n_moves))
    region = names[int(rng.choice(4, p=weights))]
    x, y = _region_point(rng, region)
    scroll_p = 0.02 + 0.45 * (1.0 - traits.metacog)
    for t in ts:
        if rng.random() < 0.35:  # hop to another region
            region = names[int(rng.choice(4, p=weights))]
            x, y = _region_point(rng, region)
        else:  # local jitter within the current region
            x0, y0, x1, y1 = REGIONS[region]
            x = float(np.clip(x + rng.normal(0, 35), x0, x1))
            y = float(np.clip(y + rng.normal(0, 25), y0, y1))
        etype = "s" if rng.random() < scroll_p else ("r" if rng.random() < 0.02 else "m")
        out.append((x, y, etype, float(t)))
    # the decision itself: a left click in the matrix region
    cx, cy = _region_point(rng, "matrix")
    out.append((cx, cy, "l", float(t1)))


def generate_matcher(
    matcher_id: str,
    task: MatchingTask,
    traits: Traits,
    *,
    seed: int = 0,
    n_decisions: int | None = None,
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Emit (decisions, mouse) frames for one matcher on one task.

    Decision loop: the matcher works through shuffled reference pairs.
    For each, the chance of picking the *correct* row decreases with the
    pair's difficulty and increases with skill (hard pairs defeat weak
    matchers); otherwise a decoy row is picked. Reported confidence couples to
    correctness through metacognition and is shifted by the bias trait.
    With probability growing in (1 - metacog), the matcher revisits an
    earlier pair and re-reports (a "mind change", Eq. 1 keeps the latest).
    """
    rng = np.random.default_rng(seed)
    if n_decisions is None:
        lo = max(10, int(0.2 * len(task.reference)))
        hi = int(1.45 * len(task.reference))
        n_decisions = int(np.clip(lo + traits.coverage * (hi - lo), lo, hi))
    ref_items = list(task.reference.items())
    rng.shuffle(ref_items)

    decisions: list[tuple] = []
    mouse: list[tuple] = []
    t = float(rng.uniform(3, 10))
    made: list[tuple[int, int, bool, float]] = []  # (row, col, correct, difficulty)
    k = 0
    step = 0
    while step < n_decisions:
        revisit = made and rng.random() < 0.03 + 0.30 * (1.0 - traits.metacog)
        if revisit:
            row_i, col_j, correct, diff = made[int(rng.integers(0, len(made)))]
        else:
            (row_ref, col_j), diff = ref_items[k % len(ref_items)]
            k += 1
            p_correct = float(
                np.clip(0.10 + traits.skill * (1.15 - 0.95 * diff), 0.02, 0.98)
            )
            correct = rng.random() < p_correct
            if correct:
                row_i = row_ref
            else:
                row_i = int(rng.choice(task.decoys[col_j]))
            made.append((row_i, col_j, correct, diff))
        # metacog < 0.18 yields *negative* confidence-correctness coupling
        # (overconfident exactly when wrong), so the population spans
        # negative resolution values as in Fig. 8. The small difficulty
        # term is metacog-independent: everyone hesitates a little on
        # hard pairs, giving the matrix the confidence structure that
        # precision-leaning matching predictors exploit.
        conf = float(
            np.clip(
                0.55
                + traits.bias
                - 0.12 * diff
                + 0.34 * (traits.metacog - 0.20) * (1.0 if correct else -1.0)
                + rng.normal(0, 0.38 - 0.18 * traits.metacog),
                0.05,
                1.0,
            )
        )
        # decision latency: deliberate/skilled matchers spend longer
        dt = float(
            rng.lognormal(
                mean=np.log(4.0 + 14.0 * traits.deliberate + 6.0 * traits.skill),
                sigma=0.45,
            )
        )
        t0, t = t, t + dt
        _emit_mouse(rng, traits, t0, t, mouse)
        decisions.append((matcher_id, task.name, step, int(row_i), int(col_j), conf, t))
        step += 1

    ddf = pd.DataFrame(decisions, columns=DECISION_COLUMNS)
    mdf = pd.DataFrame(
        [(matcher_id, task.name, x, y, e, tt) for (x, y, e, tt) in mouse],
        columns=MOUSE_COLUMNS,
    )
    return ddf, mdf
