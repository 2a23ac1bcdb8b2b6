"""Small shared utilities."""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession


def pandas_to_spark(spark: SparkSession, pdf: pd.DataFrame) -> DataFrame:
    """createDataFrame that tolerates empty frames and object columns.

    Spark cannot infer a schema from an empty dataset; for the empty
    case we fall back to an all-string schema (the oracle's comparison
    is dtype-insensitive, and an empty result only needs matching
    column names).
    """
    if len(pdf) == 0:
        schema = ", ".join(f"`{c}` string" for c in pdf.columns)
        return spark.createDataFrame([], schema=schema)
    out = pdf.copy()
    for c in out.columns:
        if out[c].dtype == object:
            # Mixed int/None object columns trip Arrow; normalize.
            non_null = out[c].dropna()
            if len(non_null) and all(
                isinstance(v, (int, float)) for v in non_null
            ):
                out[c] = pd.to_numeric(out[c])
            else:
                out[c] = out[c].astype(object)
    return spark.createDataFrame(out)
