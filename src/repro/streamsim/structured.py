"""Structured Streaming stateful witness-counter operator.

The calibration hint for this paper asks for "a Structured Streaming
stateful operator maintaining sketch counters per key with attached
witness timestamps, updated per micro-batch" — this module is that
operator, built on ``applyInPandasWithState``:

- input: an event stream ``(ts, item, witness)``;
- state per item: ``(count, witnesses)`` where ``witnesses`` keeps the
  first ``w`` witnesses (bounded, like the collection buffers of
  Algorithm 1);
- output (update mode): one row per item per micro-batch with the
  running count and witness buffer.

Tests drive it with a file source (one JSON file per micro-batch via
``maxFilesPerTrigger=1``) and an ``availableNow`` trigger into a memory
sink, then check the final counts against a plain batch ``groupBy``
oracle and the witness buffers against ground truth.
"""
from __future__ import annotations

import os

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql.streaming.state import GroupState, GroupStateTimeout

EVENT_SCHEMA = "ts long, item long, witness long"
OUTPUT_SCHEMA = "item long, count long, witnesses array<long>"
STATE_SCHEMA = "count long, witnesses array<long>"


def make_update_fn(w: int):
    """Build the per-key state-update function (witness buffer size ``w``)."""

    def update_fn(key, pdf_iter, state: GroupState):
        if state.exists:
            count, wit = state.get
            wit = list(wit)
        else:
            count, wit = 0, []
        for pdf in pdf_iter:
            pdf = pdf.sort_values("ts")
            count += len(pdf)
            need = w - len(wit)
            if need > 0:
                wit.extend(int(x) for x in pdf["witness"].head(need).tolist())
        state.update((count, wit))
        yield pd.DataFrame(
            {"item": [key[0]], "count": [count], "witnesses": [wit]}
        )

    return update_fn


def write_event_files(pdf: pd.DataFrame, directory: str, n_files: int) -> None:
    """Split events into ``n_files`` JSON files (one per micro-batch)."""
    os.makedirs(directory, exist_ok=True)
    pdf = pdf.sort_values("ts").reset_index(drop=True)
    per = max(1, -(-len(pdf) // n_files))
    for i in range(0, len(pdf), per):
        pdf.iloc[i : i + per].to_json(
            os.path.join(directory, f"events-{i // per:05d}.json"),
            orient="records",
            lines=True,
        )


def run_witness_query(
    spark: SparkSession,
    input_dir: str,
    checkpoint_dir: str,
    query_name: str,
    w: int = 16,
) -> DataFrame:
    """Run the stateful operator over all files in ``input_dir``.

    Returns the memory-sink table: one row per (item, micro-batch)
    update; the final state per item is the row with the largest count.
    """
    src = (
        spark.readStream.schema(EVENT_SCHEMA)
        .option("maxFilesPerTrigger", 1)
        .json(input_dir)
    )
    out = src.groupBy("item").applyInPandasWithState(
        make_update_fn(w),
        OUTPUT_SCHEMA,
        STATE_SCHEMA,
        "update",
        GroupStateTimeout.NoTimeout,
    )
    q = (
        out.writeStream.format("memory")
        .queryName(query_name)
        .outputMode("update")
        .option("checkpointLocation", checkpoint_dir)
        .trigger(availableNow=True)
        .start()
    )
    q.awaitTermination()
    return spark.table(query_name)


def final_state(updates: DataFrame) -> pd.DataFrame:
    """Collapse the update log to the final per-item state."""
    pdf = updates.toPandas()
    idx = pdf.groupby("item")["count"].idxmax()
    return pdf.loc[idx].reset_index(drop=True)
