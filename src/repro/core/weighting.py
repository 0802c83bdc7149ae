"""Bin weightings — Sec. 5.3, Eqs. 24–29.

A predicate tree is evaluated bottom-up into per-bin satisfaction
probability vectors at the aggregation column's 1-d resolution:

* a single-column subtree is consolidated into one integer region
  ("delayed transformation") and resolved exactly,
* a condition on another column ``j`` goes through the pair histogram:
  ``q = H^(ij) beta^(j)`` at the fine resolution, summed onto the coarse
  1-d bins and divided by the 1-d counts ``h^(i)`` (Eq. 27 — dividing by
  the 1-d counts also makes rows with NULL in ``j`` fail the predicate),
* AND combines children with an element-wise product, OR with the
  complement product (Eq. 28, conditional independence).

Weightings are ``w = h ⊙ p`` with bounds from the coverage bounds, widened
for sampling per Eq. 29 (implemented as the binomial-count standard error
``sqrt(h β(1-β)(1-ρ))`` — see DESIGN.md on the dimensional fix).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import NamedTuple, Union

import numpy as np

from repro.core import coverage as cov
from repro.core.model import HistView, PairwiseHist, map_fine_to_coarse
from repro.stats import Z_98


@dataclass(frozen=True)
class ECond:
    """Encoded condition: column index + integer region."""

    col: int
    region: cov.Region


@dataclass(frozen=True)
class EGroup:
    kind: str  # 'and' | 'or'
    children: tuple


ENode = Union[ECond, EGroup]


class Weighting(NamedTuple):
    est: np.ndarray
    lo: np.ndarray
    hi: np.ndarray


def _node_cols(node: ENode) -> set[int]:
    if isinstance(node, ECond):
        return {node.col}
    out: set[int] = set()
    for ch in node.children:
        out |= _node_cols(ch)
    return out


def _node_region(node: ENode) -> cov.Region:
    """Exact region of a single-column subtree (delayed transformation)."""
    if isinstance(node, ECond):
        return node.region
    regions = [_node_region(ch) for ch in node.children]
    out = regions[0]
    for r in regions[1:]:
        out = cov.region_intersect(out, r) if node.kind == "and" else cov.region_union(out, r)
    return out


class _Probs(NamedTuple):
    est: np.ndarray
    lo: np.ndarray
    hi: np.ndarray


def _prob_from_region(
    ph: PairwiseHist, agg: int, j: int, region: cov.Region
) -> _Probs:
    """Pr(region on column j | bin t of agg column) per coarse agg bin."""
    M, alpha = ph.M, ph.alpha
    h_coarse = ph.hists1d[agg].counts.astype(np.float64)
    safe_h = np.where(h_coarse > 0, h_coarse, 1.0)
    if j == agg:
        c = cov.region_coverage(region, ph.hists1d[agg].view(), M, alpha)
        return _Probs(c.est, c.lo, c.hi)
    pair = ph.pair(agg, j)
    H, e_agg, e_pred, _, meta_pred = pair.oriented(agg)
    pred_view = HistView(
        e_pred, H.sum(axis=0), meta_pred.vmin, meta_pred.vmax, meta_pred.uniq
    )
    c = cov.region_coverage(region, pred_view, M, alpha)
    fmap = map_fine_to_coarse(e_agg, ph.hists1d[agg].edges)
    k = ph.hists1d[agg].k
    Hf = H.astype(np.float64)

    def to_probs(beta: np.ndarray) -> np.ndarray:
        q_fine = Hf @ beta
        q = np.bincount(fmap, weights=q_fine, minlength=k)
        return np.clip(q / safe_h, 0.0, 1.0)

    return _Probs(to_probs(c.est), to_probs(c.lo), to_probs(c.hi))


def _eval_node(ph: PairwiseHist, agg: int, node: ENode) -> _Probs:
    cols = _node_cols(node)
    if len(cols) == 1:
        j = next(iter(cols))
        return _prob_from_region(ph, agg, j, _node_region(node))
    assert isinstance(node, EGroup)
    # Consolidate runs of same-column leaf conditions before independence.
    by_col: dict[int, list[ENode]] = {}
    others: list[ENode] = []
    for ch in node.children:
        ccols = _node_cols(ch)
        if len(ccols) == 1:
            by_col.setdefault(next(iter(ccols)), []).append(ch)
        else:
            others.append(ch)
    parts: list[_Probs] = []
    for j, chs in by_col.items():
        sub = chs[0] if len(chs) == 1 else EGroup(node.kind, tuple(chs))
        parts.append(_prob_from_region(ph, agg, j, _node_region(sub)))
    for ch in others:
        parts.append(_eval_node(ph, agg, ch))
    return _combine(parts, node.kind)


def _combine(parts: list[_Probs], kind: str) -> _Probs:
    if kind == "and":
        est = parts[0].est.copy()
        lo = parts[0].lo.copy()
        hi = parts[0].hi.copy()
        for p in parts[1:]:
            est *= p.est
            lo *= p.lo
            hi *= p.hi
        return _Probs(est, lo, hi)
    # OR: 1 - prod(1 - p); bounds are monotone in each child's bounds.
    est = 1.0 - parts[0].est
    lo = 1.0 - parts[0].lo
    hi = 1.0 - parts[0].hi
    for p in parts[1:]:
        est *= 1.0 - p.est
        lo *= 1.0 - p.lo
        hi *= 1.0 - p.hi
    return _Probs(1.0 - est, 1.0 - lo, 1.0 - hi)


def weights(ph: PairwiseHist, agg: int, node: ENode | None) -> Weighting:
    """Final weightings vector + bounds for aggregation column ``agg``."""
    h = ph.hists1d[agg].counts.astype(np.float64)
    if node is None:
        return Weighting(h.copy(), h.copy(), h.copy())
    p = _eval_node(ph, agg, node)
    w = h * p.est
    w_lo = h * p.lo
    w_hi = h * p.hi
    rho = ph.rho
    if rho < 1.0:
        # Eq. 29: widen for sampling uncertainty (binomial, fpc).
        se_lo = np.sqrt(h * p.lo * (1.0 - p.lo) * (1.0 - rho))
        se_hi = np.sqrt(h * p.hi * (1.0 - p.hi) * (1.0 - rho))
        w_lo = w_lo - Z_98 * se_lo
        w_hi = w_hi + Z_98 * se_hi
    w_lo = np.clip(w_lo, 0.0, h)
    w_hi = np.clip(w_hi, 0.0, h)
    return Weighting(w, np.minimum(w_lo, w), np.maximum(w_hi, w))
