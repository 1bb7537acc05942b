"""Goodman–Kruskal gamma: statistic and permutation p-value."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.ml.gamma import gamma_pvalue, gamma_with_pvalue, goodman_kruskal_gamma


def test_perfect_concordance():
    x = np.array([0.1, 0.2, 0.3, 0.4])
    y = np.array([0.0, 0.0, 1.0, 1.0])
    assert goodman_kruskal_gamma(x, y) == 1.0


def test_perfect_discordance():
    x = np.array([0.4, 0.3, 0.2, 0.1])
    y = np.array([0.0, 0.0, 1.0, 1.0])
    assert goodman_kruskal_gamma(x, y) == -1.0


def test_constant_confidence_is_zero():
    x = np.full(10, 0.5)
    y = np.arange(10) % 2
    assert goodman_kruskal_gamma(x, y) == 0.0


def test_constant_correctness_is_zero():
    x = np.linspace(0, 1, 10)
    y = np.ones(10)
    assert goodman_kruskal_gamma(x, y) == 0.0


def test_single_element_is_zero():
    assert goodman_kruskal_gamma(np.array([0.5]), np.array([1.0])) == 0.0


def test_empty_is_zero():
    assert goodman_kruskal_gamma(np.array([]), np.array([])) == 0.0


def test_shape_mismatch_raises():
    with pytest.raises(ValueError):
        goodman_kruskal_gamma(np.zeros(3), np.zeros(4))


def test_paper_example_gamma():
    """Example 1 (continued): resolution 1.0 on the Table I history.

    Correct decisions are M34, M11, M12 (M21 is wrong); latest
    confidences 1.0, 0.5, 0.5, 0.45 — every untied pair is concordant.
    """
    conf = np.array([1.0, 0.5, 0.5, 0.45])
    correct = np.array([1.0, 1.0, 1.0, 0.0])
    assert goodman_kruskal_gamma(conf, correct) == 1.0


def test_ties_excluded():
    # pairs tied in x contribute nothing; lone untied pair is concordant
    x = np.array([0.5, 0.5, 0.9])
    y = np.array([0.0, 1.0, 1.0])
    # pairs: (1,2) tied in x; (1,3) concordant; (2,3) tied in y
    assert goodman_kruskal_gamma(x, y) == 1.0


def test_symmetry():
    rng = np.random.default_rng(0)
    x = rng.random(30)
    y = rng.integers(0, 2, 30).astype(float)
    assert goodman_kruskal_gamma(x, y) == pytest.approx(goodman_kruskal_gamma(y, x))


@given(
    st.lists(st.floats(min_value=0, max_value=1, allow_nan=False), min_size=2, max_size=40)
)
@settings(max_examples=30, deadline=None)
def test_gamma_bounded(vals):
    x = np.array(vals)
    rng = np.random.default_rng(len(vals))
    y = rng.integers(0, 2, len(vals)).astype(float)
    g = goodman_kruskal_gamma(x, y)
    assert -1.0 <= g <= 1.0


def test_monotone_transform_invariance():
    rng = np.random.default_rng(1)
    x = rng.random(25)
    y = rng.integers(0, 2, 25).astype(float)
    g1 = goodman_kruskal_gamma(x, y)
    g2 = goodman_kruskal_gamma(np.exp(3 * x), y)  # strictly increasing map
    assert g1 == pytest.approx(g2)


def test_pvalue_small_for_strong_signal():
    rng = np.random.default_rng(2)
    y = rng.integers(0, 2, 60).astype(float)
    x = y * 0.5 + 0.25 + rng.random(60) * 0.1  # confidence tracks correctness
    g, p = gamma_with_pvalue(x, y, n_perm=200, seed=0)
    assert g > 0.8
    assert p < 0.05


def test_pvalue_large_for_noise():
    rng = np.random.default_rng(3)
    x = rng.random(40)
    y = rng.integers(0, 2, 40).astype(float)
    p = gamma_pvalue(x, y, n_perm=200, seed=0)
    assert p > 0.05


def test_pvalue_in_unit_interval_and_deterministic():
    rng = np.random.default_rng(4)
    x = rng.random(20)
    y = rng.integers(0, 2, 20).astype(float)
    p1 = gamma_pvalue(x, y, n_perm=50, seed=7)
    p2 = gamma_pvalue(x, y, n_perm=50, seed=7)
    assert 0.0 < p1 <= 1.0
    assert p1 == p2
