"""Structured Streaming entry point for persistent RPQ evaluation.

Realizes the paper's system model in Spark Structured Streaming: a persistent
query is *registered* (compiled to a DFA + an :class:`IncrementalRPQ` state),
then an unbounded stream of sgts drives incremental maintenance, emitting an
append-only stream of result pairs.

The source is a file stream of JSON-lines sgts (``ts, src, dst, label, op``)
— the stand-in for the paper's Kafka-like single in-order source. Each
micro-batch is handed to ``IncrementalRPQ.process_batch`` via ``foreachBatch``
(the idiomatic place for stateful DataFrame-to-DataFrame maintenance logic
that Structured Streaming's built-in operators cannot express); newly derived
results are appended to a driver-side sink list and optionally written as
JSON for downstream consumers.
"""
from __future__ import annotations

import json
import os
from dataclasses import dataclass, field

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from ..core.dfa import DFA
from .incremental import IncrementalRPQ
from .product_graph import SGT_SCHEMA


@dataclass
class ResultSink:
    """Append-only collector for result pairs emitted by the stream."""

    rows: list[tuple[str, str, int]] = field(default_factory=list)

    def pairs(self) -> set[tuple[str, str]]:
        return {(x, y) for x, y, _ in self.rows}


def write_sgt_file(path: str, sgts) -> None:
    """Serialize sgts as one JSON-lines file (atomic rename for the source)."""
    tmp = path + ".tmp"
    with open(tmp, "w") as f:
        for t in sgts:
            f.write(
                json.dumps(
                    {"ts": t.ts, "src": t.src, "dst": t.dst, "label": t.label, "op": t.op}
                )
                + "\n"
            )
    os.rename(tmp, path)


def start_streaming_rpq(
    spark: SparkSession,
    input_dir: str,
    dfa: DFA,
    window: int,
    *,
    sink: ResultSink | None = None,
    checkpoint_dir: str | None = None,
    max_files_per_trigger: int = 1,
):
    """Register a persistent RPQ over a file-source sgt stream.

    Returns ``(query, engine, sink)``; stop with ``query.stop()`` or drain
    with ``query.processAllAvailable()`` in tests.
    """
    sink = sink if sink is not None else ResultSink()
    engine = IncrementalRPQ(spark, dfa, window)

    source = (
        spark.readStream.schema(SGT_SCHEMA)
        .option("maxFilesPerTrigger", max_files_per_trigger)
        .json(input_dir)
    )

    def handle_batch(batch_df: DataFrame, epoch_id: int) -> None:
        # File sources may interleave files; restore source-timestamp order
        # (the paper assumes in-order arrival, §2).
        new = engine.process_batch(batch_df.orderBy("ts"))
        for r in new.collect():
            sink.rows.append((r["x"], r["y"], r["ts"]))

    writer = source.writeStream.foreachBatch(handle_batch)
    if checkpoint_dir is not None:
        writer = writer.option("checkpointLocation", checkpoint_dir)
    query = writer.start()
    return query, engine, sink


def run_stream_to_completion(
    spark: SparkSession,
    sgts,
    dfa: DFA,
    window: int,
    work_dir: str,
    batch_size: int = 10,
) -> tuple[set[tuple[str, str]], IncrementalRPQ]:
    """Helper: write ``sgts`` as files of ``batch_size`` tuples, stream them
    all through a persistent RPQ, and return (result pairs, engine)."""
    in_dir = os.path.join(work_dir, "in")
    os.makedirs(in_dir, exist_ok=True)
    chunks = [sgts[i : i + batch_size] for i in range(0, len(sgts), batch_size)]
    for i, chunk in enumerate(chunks):
        write_sgt_file(os.path.join(in_dir, f"part-{i:05d}.json"), chunk)
    query, engine, sink = start_streaming_rpq(
        spark, in_dir, dfa, window, max_files_per_trigger=1
    )
    try:
        query.processAllAvailable()
    finally:
        query.stop()
    return sink.pairs(), engine
