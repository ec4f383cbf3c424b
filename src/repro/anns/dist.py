"""Vectorized distance computations over array<float> embedding columns."""
import numpy as np
import pandas as pd
import pyspark.sql.functions as F
from pyspark.sql import Column, DataFrame
from pyspark.sql.types import DoubleType


def cosine_dist_udf(a: Column, b: Column) -> Column:
    """Cosine distance between two unit-norm embedding columns.

    Inputs are produced unit-norm by the encoder, so the distance is
    ``1 - dot``.  Zero vectors (empty texts) yield distance 1.0, i.e. they
    never match anything.
    """

    @F.pandas_udf(DoubleType())
    def _dist(x: pd.Series, y: pd.Series) -> pd.Series:
        xa = np.stack(x.to_numpy())
        ya = np.stack(y.to_numpy())
        return pd.Series(1.0 - np.einsum("ij,ij->i", xa, ya).astype(np.float64))

    return _dist(a, b)


def add_cosine_dist(
    df: DataFrame, a: str = "emb_l", b: str = "emb_r", out: str = "dist"
) -> DataFrame:
    """Append the cosine distance of two embedding columns as ``out``."""
    return df.withColumn(out, cosine_dist_udf(F.col(a), F.col(b)))
