"""Experiment harness — runs engines over workloads and collects the
metrics the paper's evaluation reports: relative error, bound
correctness/width, per-query latency, synopsis size and construction
time (Sec. 6, Figs. 8–11, Tables 5–6).
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines.dbest_lite import DBEstLite
from repro.baselines.deepdb_lite import DeepDBLite
from repro.core import storage
from repro.core.build import build_synopsis
from repro.core.engine import PHEngine
from repro.gd.preprocess import encode_pandas
from repro.ground_truth import ExactEngine
from repro.queries import Query


@dataclass
class QueryOutcome:
    query: Query
    truth: float | None
    est: float | None
    lo: float | None
    hi: float | None
    latency_s: float

    @property
    def rel_error(self) -> float | None:
        """Relative error in %, None when undefined (truth 0/None or no
        estimate — unanswerable queries are excluded from medians, as the
        paper's minimum-selectivity filter effectively does)."""
        if self.truth is None or self.est is None or self.truth == 0:
            return None
        return abs(self.est - self.truth) / abs(self.truth) * 100.0

    @property
    def bound_correct(self) -> bool | None:
        if self.lo is None or self.hi is None or self.truth is None:
            return None
        return self.lo - 1e-9 <= self.truth <= self.hi + 1e-9

    @property
    def bound_width_pct(self) -> float | None:
        if self.lo is None or self.hi is None or not self.truth:
            return None
        return (self.hi - self.lo) / abs(self.truth) * 100.0


@dataclass
class EngineReport:
    name: str
    outcomes: list[QueryOutcome] = field(default_factory=list)
    build_seconds: float = 0.0
    size_bytes: int = 0
    n_supported: int = 0
    n_total: int = 0

    def median_error(self, func: str | None = None) -> float | None:
        errs = [
            o.rel_error
            for o in self.outcomes
            if o.rel_error is not None and (func is None or o.query.func == func)
        ]
        return float(np.median(errs)) if errs else None

    def median_latency_ms(self) -> float | None:
        lats = [o.latency_s for o in self.outcomes]
        return float(np.median(lats)) * 1000.0 if lats else None

    def bounds_correct_rate(self) -> float | None:
        flags = [o.bound_correct for o in self.outcomes if o.bound_correct is not None]
        return 100.0 * float(np.mean(flags)) if flags else None

    def median_bound_width(self) -> float | None:
        ws = [o.bound_width_pct for o in self.outcomes if o.bound_width_pct is not None]
        return float(np.median(ws)) if ws else None

    def error_cdf_point(self, pct: float = 10.0) -> float | None:
        errs = [o.rel_error for o in self.outcomes if o.rel_error is not None]
        if not errs:
            return None
        return 100.0 * float(np.mean(np.asarray(errs) <= pct))


def run_pairwisehist(
    spark: SparkSession,
    pdf: pd.DataFrame,
    queries: list[Query],
    truths: dict[int, float | None],
    *,
    n_sample: int,
    use_gd_bases: bool = True,
    seed: int = 0,
) -> tuple[EngineReport, "object"]:
    """Build PairwiseHist via Spark and answer the workload. Returns the
    report and the BuildResult (for storage/GD follow-ups)."""
    sdf = spark.createDataFrame(pdf)
    t0 = time.perf_counter()
    built = build_synopsis(sdf, n_sample=n_sample, use_gd_bases=use_gd_bases, seed=seed)
    build_s = time.perf_counter() - t0
    engine = PHEngine(built.ph, built.infos)
    rep = EngineReport(
        "PairwiseHist",
        build_seconds=build_s,
        size_bytes=storage.synopsis_bytes(built.ph),
        n_total=len(queries),
        n_supported=len(queries),
    )
    for qi, q in enumerate(queries):
        t0 = time.perf_counter()
        r = engine.execute(q)
        dt = time.perf_counter() - t0
        rep.outcomes.append(QueryOutcome(q, truths[qi], r.est, r.lo, r.hi, dt))
    return rep, built


def run_deepdb(
    pdf: pd.DataFrame,
    infos,
    queries: list[Query],
    truths: dict[int, float | None],
    *,
    n_sample: int,
    seed: int = 0,
) -> EngineReport:
    enc = encode_pandas(pdf, infos)
    sample = enc.sample(n=min(n_sample, len(enc)), random_state=seed)
    t0 = time.perf_counter()
    model = DeepDBLite(sample, infos, n_rows=len(pdf), seed=seed)
    build_s = time.perf_counter() - t0
    rep = EngineReport(
        "DeepDB-lite", build_seconds=build_s, size_bytes=model.size_bytes, n_total=len(queries)
    )
    for qi, q in enumerate(queries):
        if not model.supports(q):
            continue
        rep.n_supported += 1
        t0 = time.perf_counter()
        r = model.execute(q)
        dt = time.perf_counter() - t0
        rep.outcomes.append(QueryOutcome(q, truths[qi], r.est, r.lo, r.hi, dt))
    return rep


def run_dbest(
    pdf: pd.DataFrame,
    infos,
    queries: list[Query],
    truths: dict[int, float | None],
    *,
    n_sample: int,
    mdn_epochs: int = 40,
    max_templates: int = 40,
    seed: int = 0,
) -> EngineReport:
    enc = encode_pandas(pdf, infos)
    sample = enc.sample(n=min(n_sample, len(enc)), random_state=seed)
    model = DBEstLite(sample, infos, n_rows=len(pdf), mdn_epochs=mdn_epochs, seed=seed)
    rep = EngineReport("DBEst++-lite", n_total=len(queries))
    for qi, q in enumerate(queries):
        if not model.supports(q):
            continue
        from repro.queries import node_columns

        pred_col = next(iter(node_columns(q.where)))
        if (
            (q.col, pred_col) not in model.templates
            and len(model.templates) >= max_templates
        ):
            continue
        model.train_template(q.col, pred_col)  # training time billed to build
        rep.n_supported += 1
        t0 = time.perf_counter()
        r = model.execute(q)
        dt = time.perf_counter() - t0
        rep.outcomes.append(QueryOutcome(q, truths[qi], r.est, r.lo, r.hi, dt))
    rep.build_seconds = model.train_seconds
    rep.size_bytes = model.size_bytes
    return rep


def compute_truths(pdf: pd.DataFrame, queries: list[Query]) -> dict[int, float | None]:
    ex = ExactEngine(pdf)
    try:
        return {qi: ex.scalar(q) for qi, q in enumerate(queries)}
    finally:
        ex.close()
