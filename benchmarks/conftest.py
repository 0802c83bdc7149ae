"""Session fixtures for benchmarks: one scaled dataset + engines built
once; benchmarks then measure the per-operation costs."""
from __future__ import annotations

import pytest

from repro.experiments.harness import compute_truths
from repro.experiments.scenarios import make_workload, scaled_dataset

ROWS = 150_000
NS = 20_000


@pytest.fixture(scope="session")
def power_scaled(spark):
    return scaled_dataset(spark, "power", ROWS)


@pytest.fixture(scope="session")
def power_workload(power_scaled):
    return make_workload(power_scaled, n_queries=60, min_selectivity=1e-3, seed=13)


@pytest.fixture(scope="session")
def power_truths(power_scaled, power_workload):
    return compute_truths(power_scaled, power_workload)


@pytest.fixture(scope="session")
def ph_built(spark, power_scaled):
    from repro.core.build import build_synopsis

    return build_synopsis(spark.createDataFrame(power_scaled), n_sample=NS, seed=3)


@pytest.fixture(scope="session")
def ph_engine(ph_built):
    from repro.core.engine import PHEngine

    return PHEngine(ph_built.ph, ph_built.infos)


@pytest.fixture(scope="session")
def deepdb_model(power_scaled, ph_built):
    from repro.baselines.deepdb_lite import DeepDBLite
    from repro.gd.preprocess import encode_pandas

    enc = encode_pandas(power_scaled, ph_built.infos)
    return DeepDBLite(enc.sample(n=NS, random_state=0), ph_built.infos, n_rows=len(power_scaled))


@pytest.fixture(scope="session")
def dbest_model(power_scaled, ph_built):
    from repro.baselines.dbest_lite import DBEstLite
    from repro.gd.preprocess import encode_pandas

    enc = encode_pandas(power_scaled, ph_built.infos)
    return DBEstLite(
        enc.sample(n=5000, random_state=0), ph_built.infos, n_rows=len(power_scaled),
        mdn_epochs=20,
    )
