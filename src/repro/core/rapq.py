"""Algorithm RAPQ — incremental RPQ evaluation under arbitrary path semantics.

Implements the paper's §3 algorithms over the Δ tree index (Definition 12):

* **RAPQ** (:meth:`RAPQEngine.process`) — per-tuple traversal of the product
  graph, guided by the query DFA;
* **Insert** (:meth:`RAPQEngine._insert`) — tree extension with timestamp
  maintenance (iterative, not recursive, so deep paths cannot overflow the
  Python stack);
* **ExpiryRAPQ** (:meth:`RAPQEngine.expire`) — lazy window expiry at slide
  boundaries with subtree reconnection;
* **Delete** (:meth:`RAPQEngine._delete`) — explicit deletions via negative
  tuples, reusing the expiry machinery (§3.2).

Each tree node ``(v, s)`` stores the timestamp of a witnessing path from the
root ``(x, s0)`` — the minimum edge timestamp along that path (Definition 9).
Timestamps are lower bounds of the best witness (the paper refreshes lazily);
``ExpiryRAPQ``'s reconnection pass is what makes this sound, and the
differential tests verify the resulting invariant: after expiry at time τ the
index derives exactly the batch result on the snapshot ``G_{W,τ}``.
"""
from __future__ import annotations

import math
from dataclasses import dataclass, field
from typing import Callable, Iterable

from ..rpq_oracle import Sgt
from .dfa import DFA
from .windows import WindowGraph

INF = math.inf
NEG_INF = -math.inf

Key = tuple[str, int]  # (vertex, automaton state)


@dataclass
class _Node:
    """A Δ-index tree node: vertex-state pair with parent pointer and ts."""

    key: Key
    ts: float
    parent: Key | None
    children: set[Key] = field(default_factory=set)


class SpanningTree:
    """A spanning tree ``T_x`` rooted at ``(x, s0)`` (Definition 12)."""

    __slots__ = ("root", "root_key", "nodes", "states_of")

    def __init__(self, root: str, start_state: int):
        self.root = root
        self.root_key: Key = (root, start_state)
        self.nodes: dict[Key, _Node] = {
            self.root_key: _Node(self.root_key, INF, None)
        }
        # vertex -> set of states it appears in (node-lookup index, §5.1.1)
        self.states_of: dict[str, set[int]] = {root: {start_state}}

    def add(self, key: Key, ts: float, parent: Key) -> _Node:
        node = _Node(key, ts, parent)
        self.nodes[key] = node
        self.nodes[parent].children.add(key)
        self.states_of.setdefault(key[0], set()).add(key[1])
        return node

    def relink(self, node: _Node, new_parent: Key, ts: float) -> None:
        if node.parent is not None and node.parent in self.nodes:
            self.nodes[node.parent].children.discard(node.key)
        node.parent = new_parent
        node.ts = ts
        self.nodes[new_parent].children.add(node.key)

    def remove(self, key: Key) -> None:
        node = self.nodes.pop(key)
        if node.parent is not None and node.parent in self.nodes:
            self.nodes[node.parent].children.discard(key)
        states = self.states_of.get(key[0])
        if states is not None:
            states.discard(key[1])
            if not states:
                del self.states_of[key[0]]

    def subtree_keys(self, key: Key) -> list[Key]:
        """All keys in the subtree rooted at ``key`` (including it)."""
        out = [key]
        stack = [key]
        while stack:
            k = stack.pop()
            for c in self.nodes[k].children:
                out.append(c)
                stack.append(c)
        return out

    @property
    def size(self) -> int:
        return len(self.nodes)


class RAPQEngine:
    """Persistent RPQ evaluation under arbitrary path semantics (§3).

    Parameters
    ----------
    dfa:
        the (minimal) query automaton.
    window:
        |W|, the window length in time units.
    slide:
        β, the slide interval; expiry runs when the stream time crosses a
        multiple of β (lazy expiration, eager evaluation).
    on_result:
        optional callback ``(ts, x, y, op)`` invoked for every appended
        (``op='+'``) or invalidated (``op='-'``) result.
    """

    def __init__(
        self,
        dfa: DFA,
        window: int,
        slide: int = 1,
        on_result: Callable[[int, str, str, str], None] | None = None,
    ):
        self.dfa = dfa
        self.window = window
        self.slide = max(1, slide)
        self.graph = WindowGraph(window)
        self.trees: dict[str, SpanningTree] = {}
        # vertex -> roots of trees containing it in some state
        self.vertex_trees: dict[str, set[str]] = {}
        self.results: dict[tuple[str, str], int] = {}  # pair -> first ts
        self.on_result = on_result
        self._last_boundary = NEG_INF
        # metrics
        self.insert_calls = 0
        self.expiry_scans = 0

    # ------------------------------------------------------------------
    # public API
    # ------------------------------------------------------------------

    def process(self, sgt: Sgt) -> set[tuple[str, str]]:
        """Consume one streaming graph tuple; returns newly reported pairs."""
        tau = sgt.ts
        boundary = (tau // self.slide) * self.slide
        if boundary > self._last_boundary:
            self._last_boundary = boundary
            self.expire(boundary)
        if sgt.op == "-":
            self._delete(sgt.src, sgt.dst, sgt.label, tau)
            return set()
        if not self._relevant(sgt.label):
            return set()
        self.graph.insert(sgt.src, sgt.dst, sgt.label, tau)
        return self._process_edge(sgt.src, sgt.dst, sgt.label, tau)

    def run(self, stream: Iterable[Sgt]) -> set[tuple[str, str]]:
        """Convenience: process a whole stream, returning the result set."""
        for sgt in stream:
            self.process(sgt)
        return set(self.results)

    def derivable_pairs(self) -> set[tuple[str, str]]:
        """Pairs currently witnessed by the index (final-state nodes).

        After ``expire(τ)`` this equals the batch result on ``G_{W,τ}`` —
        the invariant the differential tests check.
        """
        out = set()
        for x, tree in self.trees.items():
            for key in tree.nodes:
                # The root itself is never a result: results come from paths
                # of length ≥ 1 (a cycle back to (x, s0) re-uses the root
                # node, matching the paper's Insert, which only reports
                # newly created nodes).
                if key[1] in self.dfa.finals and key != tree.root_key:
                    out.add((x, key[0]))
        return out

    # ------------------------------------------------------------------
    # metrics
    # ------------------------------------------------------------------

    @property
    def n_trees(self) -> int:
        return len(self.trees)

    @property
    def n_nodes(self) -> int:
        return sum(t.size for t in self.trees.values())

    # ------------------------------------------------------------------
    # Algorithm RAPQ
    # ------------------------------------------------------------------

    def _relevant(self, label: str) -> bool:
        """Tuples whose label is not in Σ_Q are discarded (§5.2)."""
        return label in self.dfa.alphabet

    def _process_edge(
        self, u: str, v: str, label: str, tau: int
    ) -> set[tuple[str, str]]:
        results: set[tuple[str, str]] = set()
        # A new path can start at u if δ(s0, label) is defined: materialize
        # T_u so the generic traversal below extends it (Δ's root set).
        if label in self.dfa.start_labels and u not in self.trees:
            self.trees[u] = SpanningTree(u, self.dfa.start)
            self.vertex_trees.setdefault(u, set()).add(u)
        for x in list(self.vertex_trees.get(u, ())):
            tree = self.trees.get(x)
            if tree is None:
                continue
            for s in list(tree.states_of.get(u, ())):
                t = self.dfa.delta(s, label)
                if t is None:
                    continue
                parent = tree.nodes.get((u, s))
                if parent is None:
                    continue
                cand = min(tau, parent.ts)
                existing = tree.nodes.get((v, t))
                if existing is None or existing.ts < cand:
                    self._insert(tree, (u, s), (v, t), tau, results)
        self._report(results, tau)
        return results

    # ------------------------------------------------------------------
    # Algorithm Insert (iterative)
    # ------------------------------------------------------------------

    def _insert(
        self,
        tree: SpanningTree,
        parent_key: Key,
        child_key: Key,
        edge_ts: float,
        results: set[tuple[str, str]],
        inserted: set[Key] | None = None,
    ) -> set[Key]:
        """Extend ``tree`` with ``child_key`` under ``parent_key``.

        Iterative worklist version of the paper's recursive **Insert**; each
        stack entry is ``(parent, child, edge_ts)``. A node is (re)linked only
        when the candidate timestamp improves on its current one, which both
        matches line 8's guard and guarantees termination.
        """
        if inserted is None:
            inserted = set()
        stack: list[tuple[Key, Key, float]] = [(parent_key, child_key, edge_ts)]
        while stack:
            pkey, ckey, ets = stack.pop()
            self.insert_calls += 1
            parent = tree.nodes.get(pkey)
            if parent is None:
                continue
            cand = min(ets, parent.ts)
            node = tree.nodes.get(ckey)
            if node is None:
                node = tree.add(ckey, cand, pkey)
                self.vertex_trees.setdefault(ckey[0], set()).add(tree.root)
                inserted.add(ckey)
                if ckey[1] in self.dfa.finals:
                    results.add((tree.root, ckey[0]))
            elif node.ts < cand:
                tree.relink(node, pkey, cand)
                inserted.add(ckey)
            else:
                continue  # no improvement — do not expand
            # Expand along window out-edges of the child vertex (lines 7-11).
            cv, cs = ckey
            for w, lbl, w_ts in self.graph.out_edges(cv):
                q = self.dfa.delta(cs, lbl)
                if q is None:
                    continue
                child_cand = min(node.ts, w_ts)
                existing = tree.nodes.get((w, q))
                if existing is None or existing.ts < child_cand:
                    stack.append((ckey, (w, q), w_ts))
        return inserted

    def _report(self, pairs: set[tuple[str, str]], tau: int) -> None:
        for pair in pairs:
            if pair not in self.results:
                self.results[pair] = tau
                if self.on_result is not None:
                    self.on_result(tau, pair[0], pair[1], "+")

    # ------------------------------------------------------------------
    # Algorithm ExpiryRAPQ
    # ------------------------------------------------------------------

    def expire(self, tau: float, invalidate: bool = False) -> set[tuple[str, str]]:
        """Remove expired nodes, reconnecting subtrees through valid edges.

        Follows the paper's **ExpiryRAPQ** per tree: collect the potentially
        expired set P, prune it, then try to re-``Insert`` each pruned node
        from a still-valid parent over a still-valid window edge. Nodes that
        cannot be reconnected are gone for good; with ``invalidate=True``
        (the explicit-deletion path) their final-state members are returned
        and reported as negative results.
        """
        self.graph.expire(int(tau) if tau != NEG_INF else 0)
        lo = tau - self.window
        invalidated: set[tuple[str, str]] = set()
        for x in list(self.trees):
            tree = self.trees[x]
            candidates = [
                key
                for key, node in tree.nodes.items()
                if node.ts <= lo
            ]
            if not candidates:
                continue
            for key in candidates:
                if key in tree.nodes:  # parents may already be gone
                    tree.remove(key)
            reconnection_results: set[tuple[str, str]] = set()
            for (v, t) in candidates:
                self.expiry_scans += 1
                if (v, t) in tree.nodes:
                    continue  # reconnected while processing an earlier node
                for uu, lbl, e_ts in self.graph.in_edges(v):
                    if (v, t) in tree.nodes:
                        break
                    for s in list(tree.states_of.get(uu, ())):
                        if self.dfa.delta(s, lbl) != t:
                            continue
                        pnode = tree.nodes.get((uu, s))
                        if pnode is None or pnode.ts <= lo:
                            continue
                        self._insert(tree, (uu, s), (v, t), e_ts, reconnection_results)
                        if (v, t) in tree.nodes:
                            break
            # Maintain the reverse index and collect invalidations.
            for (v, t) in candidates:
                if (v, t) in tree.nodes:
                    continue
                if t in self.dfa.finals:
                    invalidated.add((x, v))
                if not tree.states_of.get(v):
                    roots = self.vertex_trees.get(v)
                    if roots is not None:
                        roots.discard(x)
                        if not roots:
                            del self.vertex_trees[v]
            # Reconnection may discover pairs not previously reported.
            self._report(reconnection_results, int(tau) if tau != NEG_INF else 0)
            # Garbage-collect trees reduced to a bare root.
            if tree.size == 1:
                del self.trees[x]
                roots = self.vertex_trees.get(x)
                if roots is not None:
                    roots.discard(x)
                    if not roots:
                        del self.vertex_trees[x]
        if invalidate and invalidated:
            still_derivable = self.derivable_pairs()
            for x, v in invalidated:
                if (x, v) in self.results and (x, v) not in still_derivable:
                    del self.results[(x, v)]
                    if self.on_result is not None:
                        self.on_result(int(tau), x, v, "-")
        return invalidated

    # ------------------------------------------------------------------
    # Algorithm Delete (§3.2)
    # ------------------------------------------------------------------

    def _delete(self, u: str, v: str, label: str, tau: int) -> set[tuple[str, str]]:
        """Process a negative tuple: mark affected subtrees expired, re-expire.

        A deleted edge matters only where it is a *tree edge* (Definition 13):
        ``(v, t).pt == (u, s)`` with ``t = δ(s, label)``. The subtree under
        each such ``(v, t)`` is marked with ``ts = −∞`` and the regular expiry
        machinery reconnects or drops it.
        """
        if not self.graph.delete(u, v, label):
            return set()
        touched = False
        for x in list(self.vertex_trees.get(v, ())):
            tree = self.trees.get(x)
            if tree is None:
                continue
            for t in list(tree.states_of.get(v, ())):
                node = tree.nodes.get((v, t))
                if node is None or node.parent is None:
                    continue
                pu, ps = node.parent
                if pu == u and self.dfa.delta(ps, label) == t:
                    for key in tree.subtree_keys((v, t)):
                        tree.nodes[key].ts = NEG_INF
                    touched = True
        if not touched:
            return set()
        return self.expire(tau, invalidate=True)
