"""Tuple serialization (Sec. 4)."""
import numpy as np
import pandas as pd

from repro.core.serialize import (
    is_null,
    serialize_row,
    serialize_table,
    serialize_tuple,
)


class TestIsNull:
    def test_none(self):
        assert is_null(None)

    def test_nan(self):
        assert is_null(float("nan"))

    def test_np_nan(self):
        assert is_null(np.nan)

    def test_strings(self):
        for s in ("", "nan", "None", "NULL", "  "):
            assert is_null(s)

    def test_values_not_null(self):
        for v in ("0", 0, "park", "nana"):
            assert not is_null(v)


class TestSerializeTuple:
    def test_paper_example(self):
        s = serialize_tuple(
            ["Park Name", "Supervisor", "City", "Country"],
            ["River Park", "Vera Onate", "Fresno", "USA"],
        )
        assert s == (
            "[CLS] Park Name River Park [SEP] Supervisor Vera Onate [SEP] "
            "City Fresno [SEP] Country USA [SEP]"
        )

    def test_nulls_skipped(self):
        s = serialize_tuple(["a", "b", "c"], ["x", None, "z"])
        assert s == "[CLS] a x [SEP] c z [SEP]"

    def test_all_null(self):
        assert serialize_tuple(["a"], [None]) == "[CLS]"

    def test_header_order_respected(self):
        s1 = serialize_tuple(["a", "b"], ["1", "2"])
        s2 = serialize_tuple(["b", "a"], ["2", "1"])
        assert s1 != s2


class TestSerializeRow:
    def test_default_order(self):
        row = pd.Series({"x": "1", "y": "2"})
        assert serialize_row(row) == "[CLS] x 1 [SEP] y 2 [SEP]"

    def test_custom_header_subset(self):
        row = pd.Series({"x": "1", "y": "2", "z": "3"})
        assert serialize_row(row, ["z", "x"]) == "[CLS] z 3 [SEP] x 1 [SEP]"


class TestSerializeTable:
    def test_one_string_per_row(self):
        df = pd.DataFrame({"a": ["1", "2"], "b": ["3", "4"]})
        out = serialize_table(df)
        assert out == ["[CLS] a 1 [SEP] b 3 [SEP]", "[CLS] a 2 [SEP] b 4 [SEP]"]

    def test_matches_serialize_row(self):
        df = pd.DataFrame({"a": ["1"], "b": [None]})
        assert serialize_table(df)[0] == serialize_row(df.iloc[0])

    def test_empty_table(self):
        assert serialize_table(pd.DataFrame({"a": []})) == []
