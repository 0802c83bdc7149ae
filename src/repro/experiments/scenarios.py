"""Shared experiment scenarios: original and IDEBench-scaled datasets,
workload construction, and the three-engine comparison used by the
table jobs and benchmarks."""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro import idebench
from repro.datasets import DATASETS, dataset_columns
from repro.experiments import harness
from repro.queries import FUNCS, WorkloadSpec, generate_workload


def original_dataset(name: str, rows: int | None = None) -> pd.DataFrame:
    spec = DATASETS[name]
    return spec.generate(rows if rows is not None else spec.default_rows())


def scaled_dataset(
    spark: SparkSession, name: str, n_scaled: int, base_rows: int | None = None, seed: int = 0
) -> pd.DataFrame:
    """IDEBench-lite scale-up of a dataset (paper: to 10^9 rows; here to
    ``n_scaled``). Generated distributed, collected for ground truth."""
    base = original_dataset(name, base_rows)
    model = idebench.fit(base)
    sdf = idebench.generate_spark(spark, model, n_scaled, seed=seed)
    return sdf.toPandas()


def make_workload(
    pdf: pd.DataFrame,
    *,
    n_queries: int,
    funcs=FUNCS,
    max_preds: int = 5,
    min_selectivity: float = 1e-4,
    group_by: bool = False,
    seed: int = 0,
):
    numeric, preds, cats = dataset_columns(pdf)
    spec = WorkloadSpec(
        n_queries=n_queries,
        funcs=funcs,
        max_preds=max_preds,
        min_selectivity=min_selectivity,
        group_by=group_by,
        seed=seed,
    )
    return generate_workload(pdf, numeric, preds, cats, spec)


def compare_engines(
    spark: SparkSession,
    pdf: pd.DataFrame,
    queries,
    *,
    ns_ph: int,
    ns_dd: int | None = None,
    ns_db: int | None = None,
    mdn_epochs: int = 40,
    max_templates: int = 40,
    with_dbest: bool = True,
    seed: int = 0,
):
    """Run PairwiseHist + both baselines on one workload. Returns
    (reports dict keyed PH/DeepDB/DBEst++, truths, BuildResult)."""
    truths = harness.compute_truths(pdf, queries)
    ph_rep, built = harness.run_pairwisehist(
        spark, pdf, queries, truths, n_sample=ns_ph, seed=seed
    )
    dd_rep = harness.run_deepdb(
        pdf, built.infos, queries, truths, n_sample=ns_dd or ns_ph, seed=seed
    )
    reports = {"PH": ph_rep, "DeepDB": dd_rep}
    if with_dbest:
        reports["DBEst++"] = harness.run_dbest(
            pdf,
            built.infos,
            queries,
            truths,
            n_sample=ns_db or ns_ph,
            mdn_epochs=mdn_epochs,
            max_templates=max_templates,
            seed=seed,
        )
    return reports, truths, built
