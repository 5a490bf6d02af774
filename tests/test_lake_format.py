"""Tests for the cell-long lake substrate (repro.lake.format)."""
import numpy as np
import pandas as pd
import pytest

from repro.lake import format as lf


@pytest.fixture()
def small_tables():
    t1 = pd.DataFrame(
        {
            "city": ["Vienna", "Salzburg", None, "Graz"],
            "price": [800000.5, 450000.0, 300000.25, None],
            "units": [10, 20, 30, 40],
            "day": pd.to_datetime(["2023-03-28", "2023-04-01", "2023-05-01", "2023-06-01"]),
        }
    )
    t2 = pd.DataFrame({"k": ["a", "b"], "v": [1.5, 2.5]})
    return {"t1": t1, "t2": t2}


class TestInferColType:
    def test_int_dtype(self):
        assert lf.infer_col_type(pd.Series([1, 2, 3])) == "int"

    def test_float_dtype(self):
        assert lf.infer_col_type(pd.Series([1.5, 2.5])) == "float"

    def test_datetime_dtype(self):
        assert lf.infer_col_type(pd.Series(pd.to_datetime(["2020-01-01"]))) == "date"

    def test_string(self):
        assert lf.infer_col_type(pd.Series(["Vienna", "Graz"])) == "string"

    def test_numeric_strings_are_int(self):
        assert lf.infer_col_type(pd.Series(["1", "2", "3"])) == "int"

    def test_float_strings(self):
        assert lf.infer_col_type(pd.Series(["1.5", "2.0"])) == "float"

    def test_date_strings(self):
        assert lf.infer_col_type(pd.Series(["2020-01-01", "2021-06-30"])) == "date"

    def test_mixed_defaults_to_string(self):
        assert lf.infer_col_type(pd.Series(["x", "1", "2020-01-01"])) == "string"

    def test_all_null_is_string(self):
        assert lf.infer_col_type(pd.Series([None, None], dtype=object)) == "string"

    def test_first_10_rule(self):
        # First 10 values numeric; junk after row 10 is not consulted (paper §3).
        s = pd.Series([str(i) for i in range(10)] + ["junk"])
        assert lf.infer_col_type(s) == "int"


class TestTableToCells:
    def test_shape(self, small_tables):
        cells = lf.table_to_cells("t1", small_tables["t1"])
        assert len(cells) == 4 * 4
        assert set(cells.columns) == {f.name for f in lf.CELL_SCHEMA.fields}

    def test_null_preserved(self, small_tables):
        cells = lf.table_to_cells("t1", small_tables["t1"])
        city = cells[cells.col_name == "city"].sort_values("row_idx")
        assert city["value"].isna().tolist() == [False, False, True, False]

    def test_num_value_for_floats(self, small_tables):
        cells = lf.table_to_cells("t1", small_tables["t1"])
        price = cells[cells.col_name == "price"].sort_values("row_idx")
        assert price["num_value"].iloc[0] == 800000.5
        assert np.isnan(price["num_value"].iloc[3])

    def test_num_value_for_dates_epoch_seconds(self, small_tables):
        cells = lf.table_to_cells("t1", small_tables["t1"])
        day = cells[cells.col_name == "day"].sort_values("row_idx")
        assert day["num_value"].iloc[0] == pd.Timestamp("2023-03-28").timestamp()

    def test_string_num_value_nan(self, small_tables):
        cells = lf.table_to_cells("t1", small_tables["t1"])
        city = cells[cells.col_name == "city"]
        assert city["num_value"].isna().all()

    def test_col_idx_order(self, small_tables):
        cells = lf.table_to_cells("t1", small_tables["t1"])
        order = cells.drop_duplicates("col_name").sort_values("col_idx")["col_name"].tolist()
        assert order == ["city", "price", "units", "day"]

    def test_empty_table(self):
        cells = lf.table_to_cells("e", pd.DataFrame())
        assert len(cells) == 0


class TestLakeSpark:
    def test_build_lake_counts(self, spark, small_tables):
        cells, meta = lf.build_lake(spark, small_tables, {"t1": "residential property prices"})
        assert cells.count() == 16 + 4
        m = {r["table_id"]: r for r in meta.collect()}
        assert m["t1"]["n_rows"] == 4 and m["t1"]["n_cols"] == 4
        assert m["t1"]["description"] == "residential property prices"
        assert m["t2"]["description"] is None

    def test_parquet_roundtrip(self, spark, small_tables, tmp_path):
        cells, meta = lf.build_lake(spark, small_tables)
        lf.write_lake(cells, meta, str(tmp_path / "lake"))
        c2, m2 = lf.read_lake(spark, str(tmp_path / "lake"))
        assert c2.count() == cells.count()
        assert m2.count() == 2
        assert set(c2.columns) == set(cells.columns)

    def test_oracle_cell_counts(self, spark, small_tables):
        from repro.oracle import assert_equivalent

        cells, _ = lf.build_lake(spark, small_tables)
        got = (
            cells.groupBy("table_id", "col_name")
            .count()
            .withColumnRenamed("count", "n")
        )
        cpdf = cells.toPandas()
        assert_equivalent(
            got,
            "SELECT table_id, col_name, count(*) AS n FROM cells GROUP BY 1, 2",
            cells=cpdf,
        )
