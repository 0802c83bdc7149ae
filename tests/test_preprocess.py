"""Tests for GreedyGD pre-processing (Spark profiling + encoding and the
driver-side codecs)."""
import numpy as np
import pandas as pd
import pytest

from repro.gd.preprocess import ColumnInfo, encode, encode_pandas, profile


@pytest.fixture(scope="module")
def mixed_pdf():
    rng = np.random.default_rng(0)
    n = 3000
    return pd.DataFrame(
        {
            "f": np.round(rng.normal(10.0, 2.0, n), 2),  # 2 decimals
            "i": rng.integers(-50, 50, n),
            "cat": rng.choice(["red", "green", "blue"], n, p=[0.6, 0.3, 0.1]),
            "nullable": np.where(rng.random(n) < 0.2, np.nan, np.round(rng.random(n), 3)),
            "flag": rng.random(n) < 0.5,
        }
    )


@pytest.fixture(scope="module")
def infos(spark, mixed_pdf):
    return profile(spark.createDataFrame(mixed_pdf))


class TestProfile:
    def test_kinds(self, infos):
        kinds = {i.name: i.kind for i in infos}
        assert kinds["f"] == "float"
        assert kinds["i"] == "int"
        assert kinds["cat"] == "cat"
        assert kinds["flag"] == "bool"

    def test_float_scale_detected(self, infos):
        by = {i.name: i for i in infos}
        assert by["f"].scale == 100.0  # 2 decimals -> x100
        assert by["nullable"].scale == 1000.0

    def test_min_subtraction(self, infos, mixed_pdf):
        by = {i.name: i for i in infos}
        assert by["i"].minval == mixed_pdf["i"].min()
        assert by["f"].minval == pytest.approx(mixed_pdf["f"].min())

    def test_frequency_ranked_categories(self, infos, mixed_pdf):
        by = {i.name: i for i in infos}
        # most frequent category gets code 0 (paper Sec. 3)
        assert by["cat"].categories[0] == "red"
        assert by["cat"].cat_codes["red"] == 0

    def test_null_counts(self, infos, mixed_pdf):
        by = {i.name: i for i in infos}
        assert by["nullable"].null_count == mixed_pdf["nullable"].isna().sum()
        assert by["f"].null_count == 0

    def test_encoded_max(self, infos, mixed_pdf):
        by = {i.name: i for i in infos}
        expected = int(round((mixed_pdf["i"].max() - mixed_pdf["i"].min())))
        assert by["i"].encoded_max == expected
        assert by["cat"].encoded_max == 2


class TestEncode:
    def test_spark_encoding_nonnegative_integers(self, spark, mixed_pdf, infos):
        enc = encode(spark.createDataFrame(mixed_pdf), infos).toPandas()
        for i in infos:
            col = enc[i.name].dropna().astype("float64")
            assert (col >= 0).all(), i.name
            assert np.allclose(col, np.round(col)), i.name  # integral values

    def test_nulls_preserved(self, spark, mixed_pdf, infos):
        enc = encode(spark.createDataFrame(mixed_pdf), infos).toPandas()
        assert enc["nullable"].isna().sum() == mixed_pdf["nullable"].isna().sum()

    def test_spark_and_pandas_encoders_agree(self, spark, mixed_pdf, infos):
        enc_s = encode(spark.createDataFrame(mixed_pdf), infos).toPandas()
        enc_p = encode_pandas(mixed_pdf, infos)
        for i in infos:
            a = enc_s[i.name].astype("float64").to_numpy()
            b = enc_p[i.name].to_numpy()
            mask = ~np.isnan(b)
            np.testing.assert_allclose(a[mask], b[mask], atol=1e-6)

    def test_oracle_on_decoded_roundtrip(self, spark, mixed_pdf, infos):
        """Encode with Spark, decode numerically, compare an aggregate
        against DuckDB on the original data via the repo oracle."""
        from pyspark.sql import functions as F

        from repro.oracle import assert_equivalent

        by = {i.name: i for i in infos}
        enc = encode(spark.createDataFrame(mixed_pdf), infos)
        dec = enc.select(
            (F.col("f") / by["f"].scale + by["f"].minval).alias("f"),
            (F.col("i") / by["i"].scale + by["i"].minval).alias("i"),
        )
        result = dec.agg(
            F.round(F.sum("f"), 2).alias("sf"), F.round(F.avg("i"), 6).alias("ai")
        )
        assert_equivalent(
            result,
            "SELECT round(sum(f), 2) AS sf, round(avg(i), 6) AS ai FROM src",
            src=mixed_pdf[["f", "i"]],
        )


class TestLiteralCodec:
    def test_numeric_roundtrip(self, infos):
        by = {i.name: i for i in infos}
        e = by["f"].encode_literal(12.34)
        assert by["f"].decode_value(e) == pytest.approx(12.34)

    def test_cat_roundtrip(self, infos):
        by = {i.name: i for i in infos}
        e = by["cat"].encode_literal("green")
        assert by["cat"].decode_value(e) == "green"

    def test_unknown_category_none(self, infos):
        by = {i.name: i for i in infos}
        assert by["cat"].encode_literal("magenta") is None

    def test_none_literal(self, infos):
        assert infos[0].encode_literal(None) is None

    def test_datetime_codec(self):
        info = ColumnInfo("t", 0, "datetime", scale=1.0, minval=1_500_000_000.0)
        ts = pd.Timestamp("2017-07-14 02:40:00")
        e = info.encode_literal(ts)
        assert e == pytest.approx(ts.value / 1e9 - 1_500_000_000.0)
        back = info.decode_value(e)
        assert back == ts

    def test_encode_series_matches_literals(self, mixed_pdf, infos):
        by = {i.name: i for i in infos}
        s = by["i"].encode_series(mixed_pdf["i"].head(10))
        for raw, enc in zip(mixed_pdf["i"].head(10), s):
            assert enc == pytest.approx(by["i"].encode_literal(raw))
