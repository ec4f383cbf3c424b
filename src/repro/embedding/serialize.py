"""Entity serialization (paper §II-B).

``serialize(e) ::= val_1 val_2 ... val_p`` — attribute names are omitted and
values concatenated in schema order.  The paper caps Sentence-BERT input at
64 tokens; our encoder has no token limit, so we cap the serialized string
at 256 characters for the same effect (bounding per-entity work).
"""
from pyspark.sql import Column, DataFrame
import pyspark.sql.functions as F

MAX_CHARS = 256


def serialize_col(attrs: list[str], max_chars: int = MAX_CHARS) -> Column:
    """Column expression serializing ``attrs`` into one lowercase text value.

    NULL/empty values vanish (concat_ws skips NULL; blank-padded empties are
    collapsed by the final regexp), matching the paper's "concatenate all
    attribute values" on records with missing fields.
    """
    joined = F.concat_ws(" ", *[F.coalesce(F.col(a), F.lit("")) for a in attrs])
    cleaned = F.regexp_replace(F.trim(F.lower(joined)), r"\s+", " ")
    return F.substring(cleaned, 1, max_chars)


def with_text(
    df: DataFrame, attrs: list[str], out_col: str = "text", max_chars: int = MAX_CHARS
) -> DataFrame:
    """Append the serialized text column for the given attribute subset."""
    return df.withColumn(out_col, serialize_col(attrs, max_chars))
