"""Tests for IsUniform (Eqs. 2-3) — the refinement driver."""
import math

import numpy as np
import pytest

from repro.core.hypothesis import is_uniform, sub_bin_count


@pytest.mark.parametrize(
    "u,expected",
    [(1, 2), (2, 2), (4, 2), (5, 3), (13, 3), (14, 4), (100, 6), (500, 10), (0, 1)],
)
def test_terrell_scott_sub_bins(u, expected):
    # s = ceil((2u)^(1/3)) per Eq. 2
    assert sub_bin_count(u) == expected
    if u > 0:
        assert sub_bin_count(u) == max(1, math.ceil((2 * u) ** (1 / 3)))


def test_uniform_data_passes():
    rng = np.random.default_rng(0)
    x = rng.uniform(0, 100, 5000)
    res = is_uniform(x, 0.0, 100.0, len(np.unique(x)), alpha=0.001)
    assert res.uniform


def test_heavily_skewed_data_rejected():
    rng = np.random.default_rng(1)
    x = rng.beta(8, 1, 5000) * 100  # mass near 100
    res = is_uniform(x, 0.0, 100.0, len(np.unique(x)), alpha=0.001)
    assert not res.uniform
    assert res.chi2 > res.critical


def test_bimodal_rejected():
    rng = np.random.default_rng(2)
    x = np.concatenate([rng.normal(10, 1, 2000), rng.normal(90, 1, 2000)])
    res = is_uniform(x, 0.0, 100.0, len(np.unique(np.round(x))), alpha=0.001)
    assert not res.uniform


def test_single_value_trivially_uniform():
    x = np.full(1000, 7.0)
    res = is_uniform(x, 0.0, 10.0, 1, alpha=0.001)
    assert res.uniform  # cannot be split usefully


def test_empty_bin_uniform():
    assert is_uniform(np.array([]), 0.0, 1.0, 0, alpha=0.001).uniform


def test_degenerate_edges_uniform():
    x = np.array([1.0, 1.0, 2.0])
    assert is_uniform(x, 2.0, 2.0, 2, alpha=0.001).uniform


def test_ratio_orders_severity():
    rng = np.random.default_rng(3)
    mild = np.concatenate([rng.uniform(0, 50, 2600), rng.uniform(50, 100, 2400)])
    severe = np.concatenate([rng.uniform(0, 50, 4500), rng.uniform(50, 100, 500)])
    u_m = len(np.unique(np.round(mild)))
    u_s = len(np.unique(np.round(severe)))
    r_mild = is_uniform(mild, 0, 100, u_m, 0.001)
    r_severe = is_uniform(severe, 0, 100, u_s, 0.001)
    assert r_severe.ratio > r_mild.ratio


@pytest.mark.parametrize("alpha", [0.05, 0.01, 0.001])
def test_alpha_controls_strictness(alpha):
    """Stricter alpha (smaller) => larger critical value => harder to
    reject."""
    rng = np.random.default_rng(4)
    x = rng.uniform(0, 1, 3000)
    res = is_uniform(x, 0.0, 1.0, 2500, alpha)
    assert res.critical > 0
    res2 = is_uniform(x, 0.0, 1.0, 2500, alpha / 10)
    assert res2.critical > res.critical


def test_false_positive_rate_bounded():
    """At alpha=0.05 roughly <=~10% of uniform samples should be rejected
    (loose check that the test statistic is calibrated)."""
    rng = np.random.default_rng(5)
    rejects = 0
    trials = 200
    for _ in range(trials):
        x = rng.uniform(0, 1, 400)
        if not is_uniform(x, 0.0, 1.0, 400, 0.05).uniform:
            rejects += 1
    assert rejects / trials < 0.15
