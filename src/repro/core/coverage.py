"""Coverage — per-predicate bin satisfaction probabilities with bounds
(Sec. 5.2, Eqs. 14–23, Theorem 2).

Conditions are first mapped to *regions*: unions of disjoint closed
integer intervals in the encoded domain (the data is integral after
GreedyGD pre-processing, minimum spacing 1). Region algebra implements the
paper's "delayed transformation": conditions on the same column that are
directly connected by AND/OR are consolidated exactly (interval
intersection/union) before any independence assumption is applied.

Coverage of a region over a histogram view follows Eq. 15 (equality:
``1/u``), Eq. 16 (range: 0 / 1 / 0.5-for-u=2 / width fraction) and the
bounds follow Eqs. 22–23 with Theorem 2 for bins that passed the
uniformity test.
"""
from __future__ import annotations

import math
from typing import NamedTuple

import numpy as np

from repro.core.hypothesis import sub_bin_count
from repro.core.model import HistView
from repro.stats import chi2_critical

INF = float("inf")

#: region = tuple of disjoint closed integer intervals (a, b), a <= b.
Region = tuple

FULL: Region = ((-INF, INF),)
EMPTY: Region = ()


def cond_region(op: str, v: float) -> Region:
    """Region of encoded values satisfying ``x OP v`` over the integers."""
    if op == "<":
        ub = math.ceil(v) - 1
        return ((-INF, ub),)
    if op == "<=":
        return ((-INF, math.floor(v)),)
    if op == ">":
        return ((math.floor(v) + 1, INF),)
    if op == ">=":
        return ((math.ceil(v), INF),)
    if op == "=":
        if float(v).is_integer():
            return ((v, v),)
        return EMPTY
    if op == "!=":
        if float(v).is_integer():
            return ((-INF, v - 1), (v + 1, INF))
        return FULL
    raise ValueError(f"unknown op {op!r}")


def region_union(r1: Region, r2: Region) -> Region:
    """Union of two regions, merging integer-adjacent intervals."""
    ivs = sorted(list(r1) + list(r2))
    out: list[tuple] = []
    for a, b in ivs:
        if out and a <= out[-1][1] + 1:
            out[-1] = (out[-1][0], max(out[-1][1], b))
        else:
            out.append((a, b))
    return tuple(out)


def region_intersect(r1: Region, r2: Region) -> Region:
    out = []
    for a1, b1 in r1:
        for a2, b2 in r2:
            a, b = max(a1, a2), min(b1, b2)
            if a <= b:
                out.append((a, b))
    return tuple(sorted(out))


def region_is_full(r: Region) -> bool:
    return r == FULL


class Coverage(NamedTuple):
    """Estimated coverage vector plus lower/upper bounds (Eqs. 14, 22–23)."""

    est: np.ndarray
    lo: np.ndarray
    hi: np.ndarray


def region_coverage(region: Region, view: HistView, M: int, alpha: float) -> Coverage:
    """Coverage of ``region`` for every bin of ``view``."""
    vmin, vmax = view.vmin, view.vmax
    u = view.uniq.astype(np.float64)
    h = view.counts.astype(np.float64)
    k = len(h)
    beta = np.zeros(k)
    occupied = view.uniq > 0
    for a, b in region:
        cl = np.maximum(a, vmin)
        ch = np.minimum(b, vmax)
        valid = (cl <= ch) & occupied
        full = valid & (a <= vmin) & (b >= vmax)
        beta[full] += 1.0
        part = valid & ~full
        if not part.any():
            continue
        # u == 2: only the extrema exist; a partial interval covers one
        # extremum (0.5 each, Eq. 16 row 3) or neither (0).
        u2 = part & (view.uniq == 2)
        if u2.any():
            covers = (cl[u2] <= vmin[u2]).astype(float) + (ch[u2] >= vmax[u2]).astype(float)
            beta[u2] += 0.5 * covers
        # Single covered point in a multi-valued bin: equality (Eq. 15).
        rest = part & (view.uniq > 2)
        if rest.any():
            point = rest & (cl == ch)
            beta[point] += 1.0 / u[point]
            frac = rest & (cl < ch)
            beta[frac] += (ch[frac] - cl[frac] + 1.0) / (vmax[frac] - vmin[frac] + 1.0)
    beta = np.clip(beta, 0.0, 1.0)
    lo, hi = coverage_bounds(beta, h, view.uniq, M, alpha)
    return Coverage(beta, lo, hi)


def coverage_bounds(
    beta: np.ndarray, h: np.ndarray, uniq: np.ndarray, M: int, alpha: float
) -> tuple[np.ndarray, np.ndarray]:
    """Eqs. 22–23: exact for beta in {0,1}; adversarial single-point bounds
    for bins below the uniformity threshold; Theorem-2 partial-count bounds
    for bins that passed the test."""
    lo = beta.copy()
    hi = beta.copy()
    fractional = (beta > 0.0) & (beta < 1.0) & (h > 0)
    if not fractional.any():
        return lo, hi
    small = fractional & (h < M)
    if small.any():
        lo[small] = np.minimum(beta[small], 1.0 / h[small])
        hi[small] = np.maximum(beta[small], 1.0 - 1.0 / h[small])
    big = fractional & (h >= M)
    if big.any():
        idx = np.flatnonzero(big)
        for t in idx:
            s = sub_bin_count(int(uniq[t]))
            if s < 2:
                continue
            crit = chi2_critical(alpha, s)
            a = math.floor(beta[t] * s)
            b = math.ceil(beta[t] * s)
            lo_t = 0.0
            if a > 0:
                lo_t = (a / s) * (1.0 - math.sqrt(crit * (s - a) / (h[t] * a)))
            hi_t = 1.0
            if b < s:
                hi_t = (b / s) * (1.0 + math.sqrt(crit * (s - b) / (h[t] * b)))
            lo[t] = min(beta[t], max(0.0, lo_t))
            hi[t] = max(beta[t], min(1.0, hi_t))
    return lo, hi
