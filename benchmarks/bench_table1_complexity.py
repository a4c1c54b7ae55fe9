"""Benchmark for Table 1: per-tuple amortized cost vs window size |W|.

Each case streams the same gMark-like graph through Algorithm RAPQ with a
different window; pytest-benchmark's per-round time divided by the stream
length is the amortized per-tuple cost the paper bounds by O(n·k²).
"""
import pytest

from repro.core.queries import query_from_text
from repro.core.rapq import RAPQEngine
from repro.streams.gmark import gmark_stream

N_EDGES = 4000
STREAM = gmark_stream(N_EDGES)
QUERY = query_from_text("(g0|g1|g2)*", name="star3")


def run(window: int) -> int:
    engine = RAPQEngine(QUERY.dfa, window=window, slide=max(1, window // 10))
    for t in STREAM:
        engine.process(t)
    return len(engine.results)


@pytest.mark.parametrize("window", [50, 100, 200])
def test_rapq_window_sweep(benchmark, window):
    results = benchmark.pedantic(run, args=(window,), rounds=3, iterations=1)
    assert results > 0
