"""Benchmark for Figure 10: the cost of explicit deletions (Algorithm Delete).

Same Yago-like stream with 0% / 5% / 10% negative tuples; the paper reports
≤ ~50% degradation that flattens with the ratio.
"""
import pytest

from repro.core.queries import LABEL_BINDINGS, make_query
from repro.core.rapq import RAPQEngine
from repro.harness.experiments import DATASET_WINDOWS
from repro.streams.generators import dataset_stream, with_deletions

BASE = dataset_stream("yago", 3000)
WINDOW, SLIDE = DATASET_WINDOWS["yago"]
STREAMS = {
    0: BASE,
    5: with_deletions(BASE, 0.05),
    10: with_deletions(BASE, 0.10),
}


def run(ratio_pct: int) -> int:
    q = make_query("Q2", LABEL_BINDINGS["yago"])
    engine = RAPQEngine(q.dfa, window=WINDOW, slide=SLIDE)
    for t in STREAMS[ratio_pct]:
        engine.process(t)
    return engine.n_nodes


@pytest.mark.parametrize("ratio_pct", [0, 5, 10])
def test_deletion_ratio(benchmark, ratio_pct):
    benchmark.pedantic(run, args=(ratio_pct,), rounds=3, iterations=1)
