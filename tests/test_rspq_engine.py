"""Algorithm RSPQ unit tests: conflicts, markings, paper Example 4.2."""
import pytest

from repro.core.dfa import compile_regex
from repro.core.regex import parse
from repro.core.rspq import BudgetExceeded, RSPQEngine
from repro.rpq_oracle import Sgt, rspq_pairs


def engine_for(text, window=100, slide=1, budget=None):
    return RSPQEngine(compile_regex(parse(text)), window=window, slide=slide, budget=budget)


class TestBasics:
    def test_single_edge(self):
        e = engine_for("a")
        assert e.process(Sgt(1, "x", "y", "a")) == {("x", "y")}

    def test_two_hop(self):
        e = engine_for("a b")
        e.process(Sgt(1, "x", "y", "a"))
        assert e.process(Sgt(2, "y", "z", "b")) == {("x", "z")}

    def test_cycle_not_simple(self):
        """(x,x) via x→y→x repeats x: excluded under simple semantics."""
        e = engine_for("a+")
        e.process(Sgt(1, "x", "y", "a"))
        got = e.process(Sgt(2, "y", "x", "a"))
        assert ("y", "x") in got
        assert ("x", "x") not in e.results

    def test_matches_oracle_on_acyclic(self):
        e = engine_for("a b*")
        stream = [
            Sgt(1, "x", "y", "a"),
            Sgt(2, "y", "z", "b"),
            Sgt(3, "z", "w", "b"),
        ]
        for t in stream:
            e.process(t)
        edges = {(t.src, t.dst, t.label) for t in stream}
        assert e.derivable_pairs() == rspq_pairs(edges, e.dfa)

    def test_irrelevant_label_discarded(self):
        e = engine_for("a")
        e.process(Sgt(1, "x", "y", "q"))
        assert e.n_trees == 0


class TestPaperExample42:
    """The running example of §4: Q1 = (follows mentions)+ on Figure 1."""

    Q1 = "(follows mentions)+"

    def stream(self):
        return [
            Sgt(13, "x", "y", "follows"),
            Sgt(13, "y", "u", "mentions"),
            Sgt(13, "x", "z", "follows"),
            Sgt(14, "z", "u", "mentions"),
            Sgt(15, "u", "v", "follows"),
            Sgt(18, "v", "y", "mentions"),
        ]

    def test_conflict_detected_and_pair_found(self):
        """Without conflict handling (x,y) would be missed (Example 4.2);
        Unmark re-explores via (z,1) and finds the simple path x,z,u,v,y."""
        e = engine_for(self.Q1, window=15)
        for t in self.stream():
            e.process(t)
        assert ("x", "y") in e.results
        assert e.conflicts > 0

    def test_final_state_matches_simple_path_oracle(self):
        e = engine_for(self.Q1, window=100)
        for t in self.stream():
            e.process(t)
        edges = {(t.src, t.dst, t.label) for t in self.stream()}
        assert e.derivable_pairs() == rspq_pairs(edges, e.dfa)

    def test_no_alternative_no_pair(self):
        """Drop the x→z→u detour: the only witness revisits y, so no (x,y)."""
        e = engine_for(self.Q1, window=100)
        for t in self.stream():
            if t.src == "z" or t.dst == "z":
                continue
            e.process(t)
        assert ("x", "y") not in e.results
        assert ("u", "y") in e.results  # u,v,y is simple


class TestMarkings:
    def test_conflict_free_single_occurrence(self):
        """Without conflicts each (v,s) occurs once (matches RAPQ invariant)."""
        e = engine_for("(a|b|c)*", window=100)
        stream = [
            Sgt(1, "x", "y", "a"),
            Sgt(2, "y", "z", "b"),
            Sgt(3, "x", "z", "c"),
            Sgt(4, "z", "y", "a"),
        ]
        for t in stream:
            e.process(t)
        for tree in e.trees.values():
            for key, occs in tree.occ.items():
                assert len(occs) == 1, (tree.root, key)

    def test_budget_exceeded_raises(self):
        e = engine_for("(a b)+", window=1000, budget=3)
        # Dense alternating-labels clique quickly exceeds 3 Extend calls.
        stream = [
            Sgt(1, "v0", "v1", "a"),
            Sgt(2, "v1", "v2", "b"),
            Sgt(3, "v2", "v0", "a"),
            Sgt(4, "v0", "v2", "b"),
            Sgt(5, "v2", "v1", "a"),
            Sgt(6, "v1", "v0", "b"),
            Sgt(7, "v0", "v1", "b"),
            Sgt(8, "v1", "v2", "a"),
        ]
        with pytest.raises(BudgetExceeded):
            for t in stream:
                e.process(t)

    def test_extend_counter_grows(self):
        e = engine_for("a*")
        e.process(Sgt(1, "x", "y", "a"))
        e.process(Sgt(2, "y", "z", "a"))
        assert e.extend_calls > 0


class TestExpiry:
    def test_window_expiry_removes_pairs(self):
        e = engine_for("a", window=5)
        e.process(Sgt(1, "x", "y", "a"))
        e.process(Sgt(20, "p", "q", "a"))
        assert e.derivable_pairs() == {("p", "q")}
        assert set(e.results) == {("x", "y"), ("p", "q")}

    def test_reconnection_after_expiry(self):
        e = engine_for("a*", window=10)
        e.process(Sgt(1, "x", "y", "a"))
        e.process(Sgt(8, "y", "z", "a"))
        e.process(Sgt(9, "w", "y", "a"))
        e.process(Sgt(12, "q", "r", "a"))  # (x,y,ts=1) expires at 12
        assert ("w", "z") in e.derivable_pairs()
        edges = e.graph.edge_set()
        assert e.derivable_pairs() == rspq_pairs(edges, e.dfa)


class TestExplicitDeletions:
    def test_delete_invalidates(self):
        e = engine_for("a b", window=100)
        e.process(Sgt(1, "x", "y", "a"))
        e.process(Sgt(2, "y", "z", "b"))
        e.process(Sgt(3, "x", "y", "a", "-"))
        assert e.derivable_pairs() == set()

    def test_delete_with_alternative(self):
        e = engine_for("a b", window=100)
        e.process(Sgt(1, "x", "y", "a"))
        e.process(Sgt(2, "y", "z", "b"))
        e.process(Sgt(3, "x", "w", "a"))
        e.process(Sgt(4, "w", "z", "b"))
        e.process(Sgt(5, "x", "y", "a", "-"))
        assert ("x", "z") in e.derivable_pairs()
