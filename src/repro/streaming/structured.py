"""Structured Streaming driver: micro-batches as DBSP timesteps.

DBSP's logical time is the sequence of transactions (§1). In Spark
Structured Streaming the natural transaction boundary is the micro-batch:
``run_stream`` attaches a DBSP circuit to a streaming DataFrame with
``foreachBatch`` — every micro-batch becomes one circuit step whose rows
are the positive part of the input change (a column ``__w`` may be
supplied by the source for deletions/weighted changes).

Because incremental circuits are *change-split invariant* (I and D are
inverses for any split of the same total input — Theorem 2.22), the
integrated output is independent of how the engine partitions rows into
micro-batches; the integration-equality test in
``tests/test_structured_streaming.py`` relies on exactly that property.
"""
from __future__ import annotations

from typing import Callable

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.zset.frame import W, ZSet


def run_stream(
    stream_df: DataFrame,
    on_change: Callable[[ZSet, int], None],
    checkpoint_dir: str,
) -> None:
    """Drive a DBSP circuit from a streaming DataFrame.

    ``stream_df`` is any streaming DataFrame (file source, rate source,
    Kafka...). If it has no ``__w`` column every row is an insertion
    (weight 1). ``on_change(delta, batch_id)`` is called once per
    micro-batch with the batch as a change Z-set — typically a closure
    that calls ``IncrementalView.step`` and collects the output deltas.

    Runs with ``availableNow`` and blocks until the backlog is drained
    (suits tests and batch-replay; for a live stream swap the trigger).
    """

    def handle(batch_df: DataFrame, batch_id: int) -> None:
        if W in batch_df.columns:
            delta = ZSet(batch_df.withColumn(W, F.col(W).cast("long")))
        else:
            delta = ZSet.from_df(batch_df)
        on_change(delta, batch_id)

    q = (
        stream_df.writeStream.foreachBatch(handle)
        .option("checkpointLocation", checkpoint_dir)
        .trigger(availableNow=True)
        .start()
    )
    q.awaitTermination()
