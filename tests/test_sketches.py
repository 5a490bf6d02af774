"""Tests for repro.core.sketches — §3 sketch semantics, Spark pipeline, oracle checks."""
import numpy as np
import pandas as pd
import pytest

from repro.core import minhash, sketches
from repro.lake import format as lf


@pytest.fixture()
def lake_tables():
    rng = np.random.default_rng(0)
    t1 = pd.DataFrame(
        {
            "region": ["AT", "AT13", "EC", "AT", None] * 10,
            "price": rng.normal(500000, 100000, 50).round(2),
            "day": pd.to_datetime("2020-01-01") + pd.to_timedelta(np.arange(50), unit="D"),
        }
    )
    t2 = pd.DataFrame(
        {
            "region": ["AT", "DE", "FR", "IT"] * 5,
            "count": np.arange(20),
        }
    )
    return {"resr": t1, "rpv": t2}


@pytest.fixture()
def col_sk_pdf(spark, lake_tables):
    cells, _ = lf.build_lake(spark, lake_tables)
    cp, _ = sketches.sketches_to_pandas(
        sketches.column_sketches(cells), sketches.table_sketches(cells)
    )
    return cp.set_index(["table_id", "col_name"])


class TestTokenize:
    def test_splits_on_nonalnum(self):
        assert sketches.tokenize(["Austria Vienna"]) == ["austria", "vienna"]

    def test_lowercases(self):
        assert sketches.tokenize(["Zambrów County"]) == ["zambr", "w", "county"]

    def test_numbers_kept(self):
        assert sketches.tokenize(["28/03/23"]) == ["28", "03", "23"]

    def test_empty(self):
        assert sketches.tokenize([]) == []
        assert sketches.tokenize(["---"]) == []


class TestNumericalSketch:
    def test_string_column(self):
        vals = pd.Series(["aa", "bb", "aa", None])
        s = sketches.numerical_sketch(vals, pd.Series([np.nan] * 4), "string", 4)
        assert s[sketches.NS_FRAC_NAN] == 0.25
        assert s[sketches.NS_FRAC_UNIQUE] == 0.5
        assert s[sketches.NS_MEAN_WIDTH] == 2.0
        assert s[sketches.NS_IS_NUMERIC] == 0.0
        assert np.all(s[sketches.NS_MIN:] == 0)

    def test_numeric_column(self):
        nums = pd.Series(np.arange(101, dtype=float))
        s = sketches.numerical_sketch(nums, nums, "float", 101)
        assert s[sketches.NS_IS_NUMERIC] == 1.0
        assert s[sketches.NS_MIN] == 0 and s[sketches.NS_MAX] == 100
        assert s[sketches.NS_MEAN] == 50
        assert s[sketches.NS_P50] == 50 and s[sketches.NS_P10] == 10
        assert s[sketches.NS_MEAN_WIDTH] == 0.0

    def test_all_nan_numeric(self):
        vals = pd.Series([None, None])
        s = sketches.numerical_sketch(vals, pd.Series([np.nan, np.nan]), "float", 2)
        assert s[sketches.NS_FRAC_NAN] == 1.0
        assert s[sketches.NS_IS_NUMERIC] == 0.0

    def test_unique_fraction_normalized_by_rows(self):
        vals = pd.Series(["a", "a", "b", "b"])
        s = sketches.numerical_sketch(vals, pd.Series([np.nan] * 4), "string", 4)
        assert s[sketches.NS_FRAC_UNIQUE] == 0.5

    def test_dim(self):
        s = sketches.numerical_sketch(pd.Series(["x"]), pd.Series([np.nan]), "string", 1)
        assert s.shape == (sketches.NUM_SKETCH_DIM,)


class TestColumnSketchesSpark:
    def test_one_row_per_column(self, spark, lake_tables):
        cells, _ = lf.build_lake(spark, lake_tables)
        sk = sketches.column_sketches(cells)
        assert sk.count() == 5  # 3 cols + 2 cols

    def test_types_inferred(self, col_sk_pdf):
        assert col_sk_pdf.loc[("resr", "region"), "col_type"] == "string"
        assert col_sk_pdf.loc[("resr", "price"), "col_type"] == "float"
        assert col_sk_pdf.loc[("resr", "day"), "col_type"] == "date"
        assert col_sk_pdf.loc[("rpv", "count"), "col_type"] == "int"

    def test_numeric_cols_have_empty_token_sig(self, col_sk_pdf):
        assert minhash.is_empty(col_sk_pdf.loc[("resr", "price"), "token_sig"])
        assert not minhash.is_empty(col_sk_pdf.loc[("resr", "region"), "token_sig"])

    def test_value_sig_jaccard_reflects_overlap(self, col_sk_pdf):
        # resr.region = {AT, AT13, EC}, rpv.region = {AT, DE, FR, IT} → J = 1/6
        a = col_sk_pdf.loc[("resr", "region"), "value_sig"]
        b = col_sk_pdf.loc[("rpv", "region"), "value_sig"]
        j = minhash.jaccard_estimate(a, b)
        assert 0.0 < j < 0.5

    def test_num_sketch_matches_local(self, col_sk_pdf, lake_tables):
        got = col_sk_pdf.loc[("rpv", "count"), "num_sketch"]
        col = lake_tables["rpv"]["count"].astype(float)
        want = sketches.numerical_sketch(col, col, "int", 20)
        np.testing.assert_allclose(got, want)

    def test_spark_sig_equals_local_sig(self, col_sk_pdf, lake_tables):
        got = col_sk_pdf.loc[("rpv", "region"), "value_sig"]
        want = minhash.minhash_signature(lake_tables["rpv"]["region"].astype(str).to_numpy())
        np.testing.assert_array_equal(got, want)

    def test_oracle_distinct_counts(self, spark, lake_tables):
        from repro.oracle import assert_equivalent

        cells, _ = lf.build_lake(spark, lake_tables)
        sk = sketches.column_sketches(cells).select(
            "table_id", "col_name", sketches.F.col("n_distinct").cast("long").alias("nd")
        )
        assert_equivalent(
            sk,
            "SELECT table_id, col_name, count(DISTINCT value) AS nd "
            "FROM cells WHERE value IS NOT NULL GROUP BY 1, 2",
            cells=cells.toPandas(),
        )

    def test_oracle_nan_fraction(self, spark, lake_tables):
        from repro.oracle import assert_equivalent
        from pyspark.sql import functions as F

        cells, _ = lf.build_lake(spark, lake_tables)
        sk = sketches.column_sketches(cells).select(
            "table_id",
            "col_name",
            F.round(F.element_at("num_sketch", sketches.NS_FRAC_NAN + 1), 6).alias("frac_nan"),
        )
        assert_equivalent(
            sk,
            "SELECT table_id, col_name, "
            "round(1.0 - count(value)::DOUBLE / count(*), 6) AS frac_nan "
            "FROM cells GROUP BY 1, 2",
            cells=cells.toPandas(),
        )


class TestTableSketchesSpark:
    def test_one_row_per_table(self, spark, lake_tables):
        cells, _ = lf.build_lake(spark, lake_tables)
        assert sketches.table_sketches(cells).count() == 2

    def test_content_sig_detects_shared_rows(self, spark):
        base = pd.DataFrame({"a": [f"v{i}" for i in range(40)], "b": np.arange(40)})
        shifted = base.iloc[:20].reset_index(drop=True)  # subset of rows
        other = pd.DataFrame({"a": [f"w{i}" for i in range(40)], "b": np.arange(100, 140)})
        cells, _ = lf.build_lake(spark, {"base": base, "sub": shifted, "other": other})
        _, tp = sketches.sketches_to_pandas(
            sketches.column_sketches(cells), sketches.table_sketches(cells)
        )
        sig = tp.set_index("table_id")["content_sig"]
        j_sub = minhash.jaccard_estimate(sig["base"], sig["sub"])
        j_other = minhash.jaccard_estimate(sig["base"], sig["other"])
        assert j_sub > 0.25
        assert j_other < 0.05

    def test_row_col_counts(self, spark, lake_tables):
        cells, _ = lf.build_lake(spark, lake_tables)
        tp = sketches.table_sketches(cells).toPandas().set_index("table_id")
        assert tp.loc["resr", "n_rows"] == 50 and tp.loc["resr", "n_cols"] == 3
        assert tp.loc["rpv", "n_rows"] == 20 and tp.loc["rpv", "n_cols"] == 2


class TestTypeDistribution:
    def test_percentages_sum_100(self, spark, lake_tables):
        cells, _ = lf.build_lake(spark, lake_tables)
        dist = sketches.lake_type_distribution(cells).toPandas()
        assert abs(dist["pct"].sum() - 100.0) < 0.1
        assert set(dist["col_type"]) == {"string", "float", "date", "int"}
