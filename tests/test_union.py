"""Outer union into unionable tuples — Spark job vs pandas vs DuckDB."""
import duckdb
import numpy as np
import pandas as pd
import pytest

from repro.core.align import holistic_alignment
from repro.core.union import (
    SRC_COL,
    UID_COL,
    outer_union,
    unionable_tuples_pandas,
)
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def aligned(tiny_santos):
    q = tiny_santos.queries[0]
    tables = tiny_santos.unionable_tables(q.name)
    return q, tables, holistic_alignment(q, tables)


class TestOuterUnion:
    def test_row_count(self, spark, aligned):
        q, tables, al = aligned
        out = outer_union(spark, q, tables, al)
        assert out.count() == sum(t.n_rows for t in tables)

    def test_schema_is_query_plus_provenance(self, spark, aligned):
        q, tables, al = aligned
        out = outer_union(spark, q, tables, al)
        assert out.columns == list(q.df.columns) + [SRC_COL, UID_COL]

    def test_unaligned_query_columns_null(self, spark, aligned):
        q, tables, al = aligned
        t = tables[0]
        covered = {
            qcol for (tn, _), qcol in al.mapping.items() if tn == t.name
        }
        missing = [c for c in q.df.columns if c not in covered]
        if not missing:
            pytest.skip("alignment covered every query column for t0")
        out = outer_union(spark, q, [t], al).toPandas()
        assert out[missing[0]].isna().all()

    def test_uid_unique(self, spark, aligned):
        q, tables, al = aligned
        out = outer_union(spark, q, tables, al).toPandas()
        assert out[UID_COL].is_unique

    def test_matches_pandas_path(self, spark, aligned):
        q, tables, al = aligned
        got = outer_union(spark, q, tables, al).toPandas()
        want = unionable_tuples_pandas(q, tables, al)
        got = got.sort_values(UID_COL).reset_index(drop=True)
        want = want.sort_values(UID_COL).reset_index(drop=True)
        pd.testing.assert_frame_equal(
            got[sorted(got.columns)], want[sorted(want.columns)], check_dtype=False
        )

    def test_oracle_union_all_by_name(self, spark, aligned):
        """The union re-stated as DuckDB UNION ALL over the projected
        parts — catches projection or null-padding mistakes."""
        q, tables, al = aligned
        out = outer_union(spark, q, tables, al)
        parts = {}
        selects = []
        for i, t in enumerate(tables):
            by_query = {
                qcol: col
                for (tn, col), qcol in al.mapping.items()
                if tn == t.name
            }
            pdf = t.df.astype(str).copy()
            pdf[UID_COL] = [f"{t.name}#{j}" for j in range(len(pdf))]
            parts[f"t{i}"] = pdf
            proj = ", ".join(
                (f'"{by_query[h]}" as "{h}"' if h in by_query else f'NULL as "{h}"')
                for h in q.df.columns
            )
            selects.append(
                f"select {proj}, '{t.name}' as {SRC_COL}, \"{UID_COL}\" from t{i}"
            )
        sql = " union all ".join(selects)
        assert_equivalent(out, sql, **parts)

    def test_no_tables_raises(self, spark, aligned):
        q, _, al = aligned
        with pytest.raises(ValueError):
            outer_union(spark, q, [], al)

    def test_values_survive_projection(self, spark, aligned):
        q, tables, al = aligned
        t = tables[0]
        out = outer_union(spark, q, [t], al).toPandas()
        for (tn, col), qcol in al.mapping.items():
            if tn != t.name:
                continue
            assert set(out[qcol]) == set(t.df[col].astype(str))
