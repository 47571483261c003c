"""Parquet lake persistence and Spark read-back."""
import os

import pandas as pd
import pytest

from repro.lake.parquet_lake import (
    load_benchmark,
    read_catalog,
    read_table_pandas,
    read_table_spark,
    write_lake,
)


@pytest.fixture(scope="module")
def lake_root(tmp_path_factory, tiny_santos):
    root = str(tmp_path_factory.mktemp("lake"))
    write_lake(tiny_santos, root)
    return root


class TestWrite:
    def test_catalog_written(self, lake_root, tiny_santos):
        cat = read_catalog(lake_root)
        assert cat["benchmark"] == tiny_santos.name
        assert len(cat["tables"]) == len(tiny_santos.queries) + len(tiny_santos.lake)

    def test_one_dir_per_table(self, lake_root, tiny_santos):
        for t in tiny_santos.lake:
            assert os.path.isdir(os.path.join(lake_root, "tables", t.name))

    def test_roles_recorded(self, lake_root, tiny_santos):
        cat = read_catalog(lake_root)
        roles = {e["name"]: e["role"] for e in cat["tables"]}
        for q in tiny_santos.queries:
            assert roles[q.name] == "query"
        for t in tiny_santos.lake:
            assert roles[t.name] == "lake"


class TestRead:
    def test_pandas_roundtrip(self, lake_root, tiny_santos):
        t = tiny_santos.lake[0]
        got = read_table_pandas(lake_root, t.name)
        pd.testing.assert_frame_equal(got, t.df.astype(str))

    def test_spark_read(self, spark, lake_root, tiny_santos):
        t = tiny_santos.lake[1]
        sdf = read_table_spark(spark, lake_root, t.name)
        assert sdf.count() == t.n_rows
        assert set(sdf.columns) == set(t.df.columns)

    def test_spark_values_match(self, spark, lake_root, tiny_santos):
        t = tiny_santos.lake[0]
        got = read_table_spark(spark, lake_root, t.name).toPandas()
        col = t.df.columns[0]
        assert sorted(got[col]) == sorted(t.df[col].astype(str))

    def test_load_benchmark_roundtrip(self, lake_root, tiny_santos):
        b = load_benchmark(lake_root)
        assert b.name == tiny_santos.name
        assert {t.name for t in b.lake} == {t.name for t in tiny_santos.lake}
        assert b.unionable == tiny_santos.unionable
        t0 = tiny_santos.lake[0]
        assert b.table(t0.name).col_map == t0.col_map
        assert b.table(t0.name).row_ids == t0.row_ids
