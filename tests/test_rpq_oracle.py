"""Tests for the reference oracles themselves (hand-computed cases)."""
import duckdb
import pandas as pd
import pytest

from repro.core.dfa import compile_regex
from repro.core.regex import parse
from repro.rpq_oracle import (
    Sgt,
    product_edge_rows,
    rapq_pairs,
    recursive_cte_sql,
    rspq_pairs,
    snapshot_edges,
    streaming_reference,
)


def dfa_of(text):
    return compile_regex(parse(text))


class TestRapqPairs:
    def test_single_edge(self):
        assert rapq_pairs([("x", "y", "a")], dfa_of("a")) == {("x", "y")}

    def test_label_mismatch(self):
        assert rapq_pairs([("x", "y", "b")], dfa_of("a")) == set()

    def test_two_hop(self):
        edges = [("x", "y", "a"), ("y", "z", "b")]
        assert rapq_pairs(edges, dfa_of("a b")) == {("x", "z")}

    def test_star_transitive(self):
        edges = [("x", "y", "a"), ("y", "z", "a")]
        assert rapq_pairs(edges, dfa_of("a*")) == {
            ("x", "y"), ("y", "z"), ("x", "z"),
        }

    def test_cycle_arbitrary_allows_revisits(self):
        # x -a-> y -a-> x -a-> y : (x,x),(y,y) need the cycle.
        edges = [("x", "y", "a"), ("y", "x", "a")]
        assert rapq_pairs(edges, dfa_of("a+")) == {
            ("x", "y"), ("y", "x"), ("x", "x"), ("y", "y"),
        }

    def test_self_pair_at_start_state_not_reported(self):
        # Engine-faithful semantics: a cycle back to (x, s0) reuses the root
        # node, so (x,x) is not reported when the DFA has a single looping
        # final start state (a*), see DESIGN.md.
        edges = [("x", "y", "a"), ("y", "x", "a")]
        assert rapq_pairs(edges, dfa_of("a*")) == {("x", "y"), ("y", "x")}

    def test_paper_figure1(self):
        """Q1 = (follows mentions)+ on the Figure 1(b) snapshot: (x,y) holds."""
        edges = [
            ("x", "y", "follows"),
            ("y", "u", "mentions"),
            ("u", "v", "follows"),
            ("v", "y", "mentions"),
        ]
        got = rapq_pairs(edges, dfa_of("(follows mentions)+"))
        assert ("x", "y") in got
        assert ("u", "y") in got


class TestRspqPairs:
    def test_simple_equals_arbitrary_on_acyclic(self):
        edges = [("x", "y", "a"), ("y", "z", "a"), ("x", "z", "a")]
        dfa = dfa_of("a*")
        assert rspq_pairs(edges, dfa) == rapq_pairs(edges, dfa)

    def test_cycle_blocks_simple_revisit(self):
        # (x,x) via x->y->x repeats x: not simple.
        edges = [("x", "y", "a"), ("y", "x", "a")]
        assert rspq_pairs(edges, dfa_of("a+")) == {("x", "y"), ("y", "x")}

    def test_paper_example_42_simple_path_exists(self):
        """Example 4.2: (x,y) holds via the simple path x,z,u,v,y."""
        edges = [
            ("x", "y", "follows"),
            ("y", "u", "mentions"),
            ("x", "z", "follows"),
            ("z", "u", "mentions"),
            ("u", "v", "follows"),
            ("v", "y", "mentions"),
        ]
        got = rspq_pairs(edges, dfa_of("(follows mentions)+"))
        assert ("x", "y") in got

    def test_no_simple_witness(self):
        """Only witness revisits y: x->y->u->v->y. Not simple, pair absent."""
        edges = [
            ("x", "y", "follows"),
            ("y", "u", "mentions"),
            ("u", "v", "follows"),
            ("v", "y", "mentions"),
        ]
        got = rspq_pairs(edges, dfa_of("(follows mentions)+"))
        assert ("x", "y") not in got
        assert ("u", "y") in got  # u,v,y is simple


class TestSnapshotAndStreaming:
    def test_snapshot_window_filter(self):
        stream = [
            Sgt(1, "a", "b", "l"),
            Sgt(5, "b", "c", "l"),
            Sgt(12, "c", "d", "l"),
        ]
        assert snapshot_edges(stream, 12, 10) == {
            ("b", "c", "l"), ("c", "d", "l"),
        }

    def test_snapshot_future_tuples_excluded(self):
        stream = [Sgt(1, "a", "b", "l"), Sgt(9, "b", "c", "l")]
        assert snapshot_edges(stream, 5, 10) == {("a", "b", "l")}

    def test_snapshot_deletion(self):
        stream = [
            Sgt(1, "a", "b", "l"),
            Sgt(2, "a", "b", "l", "-"),
        ]
        assert snapshot_edges(stream, 3, 10) == set()

    def test_snapshot_reinsert_after_delete(self):
        stream = [
            Sgt(1, "a", "b", "l"),
            Sgt(2, "a", "b", "l", "-"),
            Sgt(3, "a", "b", "l"),
        ]
        assert snapshot_edges(stream, 3, 10) == {("a", "b", "l")}

    def test_streaming_union_keeps_expired_results(self):
        """Implicit windows: results, once true in any snapshot, stay."""
        dfa = dfa_of("a b")
        stream = [Sgt(1, "x", "y", "a"), Sgt(2, "y", "z", "b"), Sgt(100, "p", "q", "a")]
        got = streaming_reference(stream, dfa, window=10)
        assert got == {("x", "z")}

    def test_streaming_window_separates_edges(self):
        """Two edges more than |W| apart never form a path."""
        dfa = dfa_of("a b")
        stream = [Sgt(1, "x", "y", "a"), Sgt(50, "y", "z", "b")]
        assert streaming_reference(stream, dfa, window=10) == set()
        assert streaming_reference(stream, dfa, window=100) == {("x", "z")}


class TestRecursiveCte:
    @pytest.mark.parametrize("text", ["a", "a b", "a*", "(a|b)+", "a b* c"])
    def test_cte_matches_bruteforce(self, text):
        dfa = dfa_of(text)
        edges = [
            ("x", "y", "a"), ("y", "z", "b"), ("z", "x", "a"),
            ("y", "w", "c"), ("w", "w", "b"),
        ]
        rows = product_edge_rows(edges, dfa)
        pe = pd.DataFrame(rows, columns=["src_v", "src_s", "dst_v", "dst_s"])
        con = duckdb.connect()
        try:
            con.register("pe", pe)
            got = set(
                map(tuple, con.execute(recursive_cte_sql(dfa)).fetchall())
            )
        finally:
            con.close()
        assert got == rapq_pairs(edges, dfa)

    def test_product_edge_rows(self):
        dfa = dfa_of("a b")
        rows = product_edge_rows([("x", "y", "a"), ("y", "z", "b")], dfa)
        assert ("x", 0, "y", dfa.delta(0, "a")) in rows
        s1 = dfa.delta(0, "a")
        assert ("y", s1, "z", dfa.delta(s1, "b")) in rows
