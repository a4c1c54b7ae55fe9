"""Benchmark for Table 4: RSPQ overhead over RAPQ on conflict-free ground.

The paper reports 1.8–2.1× p99 overhead on Yago (all queries conflict-free)
— compare the same stream through both engines; the RSPQ/RAPQ round-time
ratio is the reproduced quantity (recorded in EXPERIMENTS.md).
"""
import pytest

from repro.core.queries import LABEL_BINDINGS, make_query
from repro.core.rapq import RAPQEngine
from repro.core.rspq import RSPQEngine
from repro.harness.experiments import DATASET_WINDOWS, RSPQ_BUDGET
from repro.streams.generators import dataset_stream

STREAM = dataset_stream("yago", 3000)
WINDOW, SLIDE = DATASET_WINDOWS["yago"]


def run(engine_cls, qname, **kw):
    q = make_query(qname, LABEL_BINDINGS["yago"])
    engine = engine_cls(q.dfa, window=WINDOW, slide=SLIDE, **kw)
    for t in STREAM:
        engine.process(t)
    return len(engine.results)


@pytest.mark.parametrize("qname", ["Q1", "Q3", "Q11"])
def test_rapq_baseline(benchmark, qname):
    benchmark.pedantic(run, args=(RAPQEngine, qname), rounds=3, iterations=1)


@pytest.mark.parametrize("qname", ["Q1", "Q3", "Q11"])
def test_rspq_simple_path(benchmark, qname):
    benchmark.pedantic(
        run, args=(RSPQEngine, qname), kwargs={"budget": RSPQ_BUDGET},
        rounds=3, iterations=1,
    )
