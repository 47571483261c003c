"""Tuple serialization (Sec. 4).

``Ser(t) := [CLS] c1 v1 [SEP] c2 v2 ... [SEP] cn vn [SEP]`` — each
column header followed by its value, BERT-style special tokens kept as
literal markers. Null / empty values are skipped (Example 4 serializes
only the columns that aligned and have values).
"""
from __future__ import annotations

import pandas as pd

CLS = "[CLS]"
SEP = "[SEP]"

_NULLISH = {"", "nan", "none", "null", "<na>"}


def is_null(value) -> bool:
    if value is None:
        return True
    try:
        if pd.isna(value):
            return True
    except (TypeError, ValueError):
        pass
    return str(value).strip().lower() in _NULLISH


def serialize_tuple(headers: list[str], values: list) -> str:
    """Serialize one tuple given parallel header/value lists, skipping
    nulls. An all-null tuple serializes to just ``[CLS]``."""
    parts = [CLS]
    for h, v in zip(headers, values):
        if is_null(v):
            continue
        parts.append(f"{h} {v}")
        parts.append(SEP)
    return " ".join(parts)


def serialize_row(row: pd.Series, headers: list[str] | None = None) -> str:
    """Serialize a pandas row using the given header order (defaults to
    the row's own index order)."""
    hs = list(headers) if headers is not None else list(row.index)
    return serialize_tuple(hs, [row[h] for h in hs])


def serialize_table(df: pd.DataFrame, headers: list[str] | None = None) -> list[str]:
    hs = list(headers) if headers is not None else list(df.columns)
    sub = df[hs]
    return [serialize_tuple(hs, list(vals)) for vals in sub.itertuples(index=False)]
