"""Benchmark for Figure 11: incremental evaluation vs batch re-evaluation.

Three cases, each timing one slide step on a warmed window:

* ``incremental_delta_tree`` — the Δ-tree RAPQ engine consumes one slide's
  worth of tuples (the paper's incremental side);
* ``batch_reevaluation`` — the Spark DataFrame fixpoint re-evaluates the
  whole window snapshot from scratch (the §5.6 Virtuoso-emulation baseline,
  one evaluation per slide instead of the paper's per-tuple);
* ``incremental_dataflow`` — the micro-batch IncrementalRPQ engine, included
  for transparency: at this scale its per-batch fixed costs dominate, which
  is why the Δ-tree engine is the headline incremental implementation.

The reproduced quantity is batch_reevaluation / incremental_delta_tree
(paper: up to three orders of magnitude).
"""
import pytest

from repro.core.queries import LABEL_BINDINGS, make_query
from repro.core.rapq import RAPQEngine
from repro.dataflow.batch_eval import batch_rapq
from repro.dataflow.incremental import IncrementalRPQ
from repro.dataflow.product_graph import SGT_SCHEMA
from repro.streams.generators import dataset_stream

WINDOW, SLIDE = 100, 25
STREAM = dataset_stream("yago", 1200)
QUERY = make_query("Q2", LABEL_BINDINGS["yago"])


def _chunks():
    out = {}
    for t in STREAM:
        out.setdefault(t.ts // SLIDE, []).append(t)
    return [out[k] for k in sorted(out)]


def test_incremental_delta_tree_step(benchmark):
    chunks = _chunks()

    def setup():
        engine = RAPQEngine(QUERY.dfa, window=WINDOW, slide=SLIDE)
        for c in chunks[:-1]:
            for t in c:
                engine.process(t)
        return (engine,), {}

    def step(engine):
        for t in chunks[-1]:
            engine.process(t)
        return len(engine.results)

    benchmark.pedantic(step, setup=setup, rounds=3, iterations=1)


def test_batch_reevaluation_step(benchmark, spark):
    chunks = _chunks()
    seen = {}
    for c in chunks:
        for t in c:
            seen[(t.src, t.dst, t.label)] = t
    wm = max(t.ts for t in chunks[-1])
    live = [
        (t.src, t.dst, t.label)
        for t in seen.values()
        if t.op == "+" and wm - WINDOW < t.ts <= wm
    ]
    edges = spark.createDataFrame(
        live, "src STRING, dst STRING, label STRING"
    ).localCheckpoint(eager=True)

    def step():
        return batch_rapq(edges, QUERY.dfa).count()

    benchmark.pedantic(step, rounds=3, iterations=1)


def test_incremental_dataflow_step(benchmark, spark):
    chunks = _chunks()
    engine = IncrementalRPQ(spark, QUERY.dfa, WINDOW)
    for c in chunks[:-1]:  # warm state up to the last slide
        engine.process_batch(
            spark.createDataFrame(
                [(t.ts, t.src, t.dst, t.label, t.op) for t in c], SGT_SCHEMA
            )
        )
    last = spark.createDataFrame(
        [(t.ts, t.src, t.dst, t.label, t.op) for t in chunks[-1]], SGT_SCHEMA
    ).localCheckpoint(eager=True)

    def step():
        engine.process_batch(last)
        return 1

    benchmark.pedantic(step, rounds=3, iterations=1)
