"""Tests for the GreedyGD base/deviation compressor."""
import numpy as np
import pandas as pd
import pytest

from repro.gd import greedygd
from repro.gd.preprocess import ColumnInfo, encode, profile


def _infos(pdf):
    return [
        ColumnInfo(c, k, "int", maxval=float(np.nanmax(pdf[c])))
        for k, c in enumerate(pdf.columns)
    ]


@pytest.fixture(scope="module")
def redundant_pdf():
    """IoT-like: smooth values whose high bits repeat a lot."""
    rng = np.random.default_rng(0)
    n = 6000
    base = rng.integers(0, 16, n) * 256  # 16 distinct high-bit patterns
    return pd.DataFrame(
        {
            "s1": (base + rng.integers(0, 256, n)).astype(float),
            "s2": (base // 2 + rng.integers(0, 128, n)).astype(float),
        }
    )


class TestPlan:
    def test_plan_moves_noise_bits_to_deviation(self, redundant_pdf):
        plan = greedygd.choose_plan(redundant_pdf, _infos(redundant_pdf))
        assert plan.dev_bits["s1"] >= 6  # low 8 bits are noise
        assert all(0 <= plan.dev_bits[c] <= plan.total_bits[c] for c in plan.columns)

    def test_plan_on_incompressible_data(self):
        rng = np.random.default_rng(1)
        pdf = pd.DataFrame({"r": rng.integers(0, 2**20, 4000).astype(float)})
        plan = greedygd.choose_plan(pdf, _infos(pdf))
        # everything is noise: nearly all bits should be deviation
        assert plan.dev_bits["r"] >= plan.total_bits["r"] - 4

    def test_empty_sample(self):
        pdf = pd.DataFrame({"x": pd.Series([], dtype="float64")})
        plan = greedygd.choose_plan(pdf, [ColumnInfo("x", 0, "int", maxval=10)])
        assert plan.dev_bits["x"] == 0


class TestSplitReconstruct:
    @pytest.mark.parametrize("dev_bits", [0, 3, 8, 17])
    def test_lossless(self, dev_bits):
        rng = np.random.default_rng(2)
        vals = rng.integers(0, 2**24, 1000)
        base, dev = greedygd.split_rows(vals, dev_bits)
        np.testing.assert_array_equal(greedygd.reconstruct(base, dev, dev_bits), vals)
        assert (dev < 2**dev_bits).all() or dev_bits == 0


class TestCompressStats:
    def test_redundant_data_compresses(self, spark, redundant_pdf):
        infos = _infos(redundant_pdf)
        sdf = spark.createDataFrame(redundant_pdf)
        enc = encode(sdf, profile(sdf))
        plan = greedygd.choose_plan(redundant_pdf, infos)
        stats = greedygd.compress_stats(enc, plan)
        assert stats.n_rows == len(redundant_pdf)
        assert stats.n_bases < stats.n_rows / 3
        assert stats.ratio > 1.0

    def test_base_count_at_least_distinct_patterns(self, spark, redundant_pdf):
        infos = _infos(redundant_pdf)
        sdf = spark.createDataFrame(redundant_pdf)
        enc = encode(sdf, profile(sdf))
        plan = greedygd.choose_plan(redundant_pdf, infos)
        stats = greedygd.compress_stats(enc, plan)
        assert stats.n_bases >= 16  # at least the planted pattern count


class TestBaseEdges:
    def test_edges_are_shifted_bases(self, redundant_pdf):
        plan = greedygd.choose_plan(redundant_pdf, _infos(redundant_pdf))
        edges = greedygd.base_edges(redundant_pdf, plan)
        b = plan.dev_bits["s1"]
        vals = edges["s1"].astype(np.int64)
        assert ((vals >> b) << b == vals).all()
        assert np.all(np.diff(vals) > 0)

    def test_nan_tolerated(self):
        pdf = pd.DataFrame({"x": [1.0, np.nan, 255.0, 257.0]})
        plan = greedygd.GDPlan(["x"], {"x": 4}, {"x": 10})
        edges = greedygd.base_edges(pdf, plan)
        assert len(edges["x"]) >= 1
