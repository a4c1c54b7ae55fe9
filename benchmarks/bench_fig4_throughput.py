"""Benchmark for Figure 4 (as a table): RAPQ throughput per query per graph.

One benchmark case per (dataset, query) for a representative query subset:
Q1 (pure star), Q4 (star over all labels — the SO worst case), Q11 (the
non-recursive fastest case). Throughput = stream length / round time.
"""
import pytest

from repro.core.queries import make_query, LABEL_BINDINGS
from repro.core.rapq import RAPQEngine
from repro.harness.experiments import DATASET_WINDOWS
from repro.streams.generators import dataset_stream

N_EDGES = {"so": 2000, "ldbc": 3000, "yago": 3000}
STREAMS = {ds: dataset_stream(ds, n) for ds, n in N_EDGES.items()}


def run(ds: str, qname: str) -> int:
    q = make_query(qname, LABEL_BINDINGS[ds])
    window, slide = DATASET_WINDOWS[ds]
    engine = RAPQEngine(q.dfa, window=window, slide=slide)
    for t in STREAMS[ds]:
        engine.process(t)
    return engine.n_nodes


@pytest.mark.parametrize("ds", ["so", "ldbc", "yago"])
@pytest.mark.parametrize("qname", ["Q1", "Q4", "Q11"])
def test_rapq_throughput(benchmark, ds, qname):
    benchmark.pedantic(run, args=(ds, qname), rounds=3, iterations=1)
