"""Differential testing of Algorithm RAPQ against brute-force oracles.

Random small streams are replayed with eager expiry (β=1). After every tuple
the Δ index must derive exactly the batch result on the current snapshot
(Lemma 1's invariants), and the final result set must equal the
union-of-snapshots reference (Definition 9).
"""
import random

import pytest

from repro.core.dfa import compile_regex
from repro.core.rapq import RAPQEngine
from repro.core.regex import parse
from repro.rpq_oracle import (
    Sgt,
    rapq_pairs,
    snapshot_edges,
    streaming_reference,
)

QUERIES = [
    "a*",
    "a b*",
    "a b* c*",
    "(a|b|c)*",
    "a b* c",
    "a* b*",
    "a b c*",
    "a? b*",
    "(a|b|c)+",
    "(a|b|c) b*",
    "a b c",
    "(a b)+",
]


def random_stream(seed, n=40, n_vertices=6, labels=("a", "b", "c"),
                  max_gap=3, delete_prob=0.0):
    """A random small stream with non-decreasing integer timestamps."""
    rng = random.Random(seed)
    verts = [f"v{i}" for i in range(n_vertices)]
    ts = 0
    stream = []
    live = []
    for _ in range(n):
        ts += rng.randint(0, max_gap)
        if live and rng.random() < delete_prob:
            u, v, lbl = rng.choice(live)
            stream.append(Sgt(ts, u, v, lbl, "-"))
            live.remove((u, v, lbl))
        else:
            u, v = rng.choice(verts), rng.choice(verts)
            lbl = rng.choice(labels)
            stream.append(Sgt(ts, u, v, lbl))
            if (u, v, lbl) not in live:
                live.append((u, v, lbl))
    return stream


def replay_and_check(query_text, stream, window):
    dfa = compile_regex(parse(query_text))
    engine = RAPQEngine(dfa, window=window, slide=1)
    for i, t in enumerate(stream):
        engine.process(t)
        if i % 5 == 4 or i == len(stream) - 1:  # probe periodically + at end
            snap = snapshot_edges(stream[: i + 1], t.ts, window)
            expected = rapq_pairs(snap, dfa)
            got = engine.derivable_pairs()
            assert got == expected, (
                f"{query_text} step {i} ts={t.ts}: index={sorted(got)} "
                f"batch={sorted(expected)} snap={sorted(snap)}"
            )
    return engine


@pytest.mark.parametrize("query", QUERIES)
@pytest.mark.parametrize("seed", range(6))
def test_append_only_invariant_and_final_results(query, seed):
    stream = random_stream(seed, n=40)
    window = [8, 15, 30][seed % 3]
    engine = replay_and_check(query, stream, window)
    expected_final = streaming_reference(stream, engine.dfa, window)
    assert set(engine.results) == expected_final


@pytest.mark.parametrize("query", ["a*", "a b*", "(a|b|c)+", "a b c", "(a b)+"])
@pytest.mark.parametrize("seed", range(8))
def test_with_explicit_deletions_invariant(query, seed):
    """With deletions the index must still track the snapshot exactly."""
    stream = random_stream(seed, n=50, delete_prob=0.25)
    window = [10, 20][seed % 2]
    replay_and_check(query, stream, window)


@pytest.mark.parametrize("seed", range(4))
def test_dense_single_label_stress(seed):
    """Homogeneous dense graphs (the SO-graph regime) with a looping query."""
    stream = random_stream(seed, n=60, n_vertices=4, labels=("a",))
    replay_and_check("a*", stream, window=12)
    replay_and_check("a+", stream, window=12)


@pytest.mark.parametrize("seed", range(4))
def test_two_state_cycle_query_stress(seed):
    """(a b)+ forces state alternation around cycles (Figure 1 regime)."""
    stream = random_stream(seed, n=60, n_vertices=5, labels=("a", "b"))
    replay_and_check("(a b)+", stream, window=14)


@pytest.mark.parametrize("slide", [2, 5, 10])
@pytest.mark.parametrize("query", ["a b*", "(a|b|c)+"])
def test_lazy_expiry_sandwich(slide, query):
    """Lazy expiration (β>1) trades exactness for batched maintenance.

    Between boundaries the engine retains edges up to |W|+β old, so its
    result set is sandwiched between the eager references for |W| and
    |W|+β (§2: eager evaluation, lazy expiration). Completeness — every
    Definition-9 result — must always hold.
    """
    window = 15
    dfa = compile_regex(parse(query))
    stream = random_stream(3, n=60)
    engine = RAPQEngine(dfa, window=window, slide=slide)
    for i, t in enumerate(stream):
        engine.process(t)
        must_have = rapq_pairs(
            snapshot_edges(stream[: i + 1], t.ts, window), dfa
        )
        assert must_have <= engine.derivable_pairs()
    lower = streaming_reference(stream, dfa, window)
    upper = streaming_reference(stream, dfa, window + slide)
    assert lower <= set(engine.results) <= upper
