"""Series <-> DataFrame conversions.

A series collection is a DataFrame ``(series_id: bigint, value:
array<float>)``; the long ("unpivoted") form ``(series_id, pos, val)``
feeds the DuckDB brute-force k-NN oracle.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

SERIES_SCHEMA = "series_id bigint, value array<float>"


def series_to_df(spark: SparkSession, X: np.ndarray, ids: np.ndarray | None = None) -> DataFrame:
    """Wrap a series matrix as a (series_id, value) DataFrame."""
    X = np.asarray(X, dtype=np.float32)
    if ids is None:
        ids = np.arange(len(X))
    # ndarray cells (not Python lists): Arrow converts them directly and
    # a 300k x 256 batch stays ~300 MB instead of gigabytes of boxed floats.
    pdf = pd.DataFrame(
        {"series_id": np.asarray(ids, dtype=np.int64), "value": list(X)}
    )
    return spark.createDataFrame(pdf, schema=SERIES_SCHEMA)


def df_to_series(df: DataFrame) -> tuple[np.ndarray, np.ndarray]:
    """Collect a (series_id, value) DataFrame back to (X, ids)."""
    pdf = df.toPandas()
    X = np.stack(pdf["value"].to_numpy()).astype(np.float32)
    return X, pdf["series_id"].to_numpy(dtype=np.int64)


def series_long_df(df: DataFrame) -> DataFrame:
    """Explode to long form (series_id, pos, val) for the SQL oracle."""
    return df.select(
        "series_id", F.posexplode("value").alias("pos", "val")
    )


def series_long_pandas(X: np.ndarray, ids: np.ndarray) -> pd.DataFrame:
    """Long form as pandas (for registering directly with DuckDB)."""
    n, length = X.shape
    return pd.DataFrame(
        {
            "series_id": np.repeat(np.asarray(ids, dtype=np.int64), length),
            "pos": np.tile(np.arange(length), n),
            "val": np.asarray(X, dtype=np.float64).ravel(),
        }
    )
