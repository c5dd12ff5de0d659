"""Quantity normalization (paper §II-C).

"Quantities were preprocessed to match a specific numerical value. '2-4'
was averaged to 3, '2 1/2' was converted to 2.5 and so on." This module
is that preprocessing: a pure function plus a Spark column wrapper.
"""
from __future__ import annotations

import re

import pandas as pd
from pyspark.sql import Column
from pyspark.sql import functions as sf
from pyspark.sql.functions import pandas_udf
from pyspark.sql.types import DoubleType

_UNICODE_FRACTIONS = {
    "½": "1/2", "⅓": "1/3", "⅔": "2/3", "¼": "1/4", "¾": "3/4",
    "⅛": "1/8", "⅜": "3/8", "⅝": "5/8", "⅞": "7/8",
}

_NUMBER_RE = re.compile(r"^\d+(\.\d+)?$")
_FRACTION_RE = re.compile(r"^(\d+)\s*/\s*(\d+)$")
_MIXED_RE = re.compile(r"^(\d+)\s+(\d+)\s*/\s*(\d+)$")
_RANGE_RE = re.compile(r"^(\d+(?:\.\d+)?)\s*(?:-|–|to)\s*(\d+(?:\.\d+)?)$")


def _simple(tok: str) -> float | None:
    """A bare number, fraction, or mixed number — no ranges."""
    tok = tok.strip()
    if _NUMBER_RE.match(tok):
        return float(tok)
    if m := _FRACTION_RE.match(tok):
        den = int(m.group(2))
        return int(m.group(1)) / den if den else None
    if m := _MIXED_RE.match(tok):
        den = int(m.group(3))
        return int(m.group(1)) + int(m.group(2)) / den if den else None
    return None


def parse_quantity(text: str | None) -> float | None:
    """Normalize a quantity string to a float.

    >>> [parse_quantity(s) for s in ("1/2", "2 1/2", "2-4", "3", "1.5")]
    [0.5, 2.5, 3.0, 3.0, 1.5]
    >>> parse_quantity("½") == 0.5 and parse_quantity("garbage") is None
    True
    """
    if text is None:
        return None
    s = text.strip()
    for uni, ascii_ in _UNICODE_FRACTIONS.items():
        s = s.replace(uni, " " + ascii_)
    s = re.sub(r"\s+", " ", s).strip()
    if (v := _simple(s)) is not None:
        return v
    if m := _RANGE_RE.match(s):
        return (float(m.group(1)) + float(m.group(2))) / 2.0
    return None


# DataType instance, not a DDL string — constructible before any session.
@pandas_udf(DoubleType())
def _parse_quantity_udf(s: pd.Series) -> pd.Series:
    return s.map(parse_quantity, na_action="ignore").astype("float64")


def parse_quantity_col(col: Column) -> Column:
    """Spark column form of :func:`parse_quantity` (Arrow-vectorized)."""
    return sf.when(col.isNull(), sf.lit(None).cast("double")).otherwise(
        _parse_quantity_udf(col)
    )
