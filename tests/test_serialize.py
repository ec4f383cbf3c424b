"""Tests for entity serialization (paper §II-B), with DuckDB oracle."""
import pandas as pd
import pyspark.sql.functions as F

from repro.embedding import serialize_col, with_text
from repro.oracle import assert_equivalent


def _df(spark):
    pdf = pd.DataFrame(
        {
            "uid": ["a", "b", "c", "d"],
            "title": ["Apple iPhone 8", "pixel  7a", None, "  Edge Case "],
            "brand": ["Apple", None, "nokia", ""],
        }
    )
    return spark.createDataFrame(pdf), pdf


def test_serialize_concatenates_values_in_order(spark):
    df, _ = _df(spark)
    out = with_text(df, ["title", "brand"]).where("uid = 'a'").first()
    assert out["text"] == "apple iphone 8 apple"


def test_serialize_lowercases(spark):
    df, _ = _df(spark)
    rows = with_text(df, ["title", "brand"]).collect()
    assert all(r["text"] == r["text"].lower() for r in rows)


def test_serialize_handles_null_and_empty(spark):
    df, _ = _df(spark)
    out = {r["uid"]: r["text"] for r in with_text(df, ["title", "brand"]).collect()}
    assert out["b"] == "pixel 7a"
    assert out["c"] == "nokia"
    assert out["d"] == "edge case"


def test_serialize_collapses_whitespace(spark):
    df, _ = _df(spark)
    rows = with_text(df, ["title", "brand"]).collect()
    assert all("  " not in r["text"] for r in rows)


def test_serialize_respects_attr_subset(spark):
    df, _ = _df(spark)
    out = with_text(df, ["brand"]).where("uid = 'a'").first()
    assert out["text"] == "apple"


def test_serialize_max_chars(spark):
    pdf = pd.DataFrame({"uid": ["x"], "t": ["word " * 200]})
    df = spark.createDataFrame(pdf)
    out = with_text(df, ["t"], max_chars=50).first()
    assert len(out["text"]) == 50


def test_serialize_oracle_equivalence(spark):
    """Serialization matches an equivalent DuckDB SQL expression."""
    df, pdf = _df(spark)
    got = with_text(df, ["title", "brand"]).select("uid", "text")
    assert_equivalent(
        got,
        """
        SELECT uid,
               substr(trim(regexp_replace(lower(
                 concat_ws(' ', coalesce(title, ''), coalesce(brand, ''))
               ), '\\s+', ' ', 'g')), 1, 256) AS text
        FROM t
        """,
        t=pdf,
    )


def test_serialize_col_is_column_expression(spark):
    df, _ = _df(spark)
    # usable inside arbitrary projections
    out = df.select(serialize_col(["brand"]).alias("s")).collect()
    assert [r["s"] for r in out] == ["apple", "", "nokia", ""]
