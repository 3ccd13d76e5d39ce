"""Edge-stream substrate: schema, ordering, and micro-batching.

A *stream* is a Spark DataFrame with columns

- ``pos``  (long)  — position in the single-pass total order, unique,
- ``a``    (long)  — A-side vertex (the *item* in the witness framing),
- ``b``    (long)  — B-side vertex (the *witness*: timestamp, user, …),
- ``op``   (int)   — ``+1`` insertion, ``-1`` deletion (turnstile only).

All ordering/batching goes through Catalyst; the sequential algorithms
then consume pandas micro-batches **in stream order** (reservoir
sampling is order-sequential by definition — the total order *is* the
streaming model, see DESIGN.md § Layering).
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.window import Window

STREAM_COLS = ["pos", "a", "b", "op"]


def stream_from_pandas(spark: SparkSession, pdf: pd.DataFrame) -> DataFrame:
    """Lift a pandas edge list into the canonical stream schema."""
    pdf = pdf.copy()
    if "op" not in pdf.columns:
        pdf["op"] = 1
    if "pos" not in pdf.columns:
        pdf["pos"] = np.arange(len(pdf), dtype=np.int64)
    pdf = pdf[STREAM_COLS].astype(
        {"pos": "int64", "a": "int64", "b": "int64", "op": "int32"}
    )
    return spark.createDataFrame(pdf)


def with_batch_id(df: DataFrame, batch_size: int) -> DataFrame:
    """Assign ``batch = floor(pos / batch_size)`` via Catalyst."""
    return df.withColumn("batch", F.floor(F.col("pos") / F.lit(batch_size)))


def iter_batches(df: DataFrame, batch_size: int) -> Iterator[pd.DataFrame]:
    """Yield pandas micro-batches in stream order.

    The Spark side sorts by ``pos`` (Catalyst sort); the driver slices
    the Arrow-collected result into micro-batches. For the data sizes
    of this reproduction (<= a few million edges) a single ordered
    collect is the honest and fast way to impose the stream's total
    order; batch boundaries are the micro-batch boundaries the
    processors see.
    """
    pdf = df.orderBy("pos").toPandas()
    for lo in range(0, len(pdf), batch_size):
        yield pdf.iloc[lo : lo + batch_size].reset_index(drop=True)


def permute_stream(df: DataFrame, seed: int) -> DataFrame:
    """Re-draw ``pos`` as a random permutation (seeded, via Catalyst)."""
    w = F.row_number().over(Window.orderBy(F.rand(seed), F.col("a"), F.col("b")))
    return df.withColumn("pos", (w - F.lit(1)).cast("long"))


def final_graph(pdf: pd.DataFrame) -> pd.DataFrame:
    """Materialise the graph described by a (possibly turnstile) stream.

    Returns the distinct ``(a, b)`` pairs whose net multiplicity is
    positive — for insertion-only simple streams this is just the edge
    list.
    """
    net = pdf.groupby(["a", "b"])["op"].sum()
    alive = net[net > 0].reset_index()[["a", "b"]]
    return alive.reset_index(drop=True)
