"""Thompson construction of an ε-NFA from a regex AST (paper §2, [65]).

The NFA is the intermediate form between the user's RPQ and the minimal DFA
used by the streaming engines; it is also used directly in tests as a second
membership-checking implementation.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from .regex import Alt, Concat, Epsilon, Opt, Plus, Regex, Star, Sym

EPS = None  # ε-transition marker


@dataclass
class NFA:
    """ε-NFA with a single start and a single accept state (Thompson form)."""

    start: int
    accept: int
    # transitions[state] -> list of (label-or-EPS, next_state)
    transitions: dict[int, list[tuple[str | None, int]]] = field(default_factory=dict)

    @property
    def n_states(self) -> int:
        states = {self.start, self.accept}
        for s, outs in self.transitions.items():
            states.add(s)
            states.update(t for _, t in outs)
        return len(states)

    def eps_closure(self, states: frozenset[int]) -> frozenset[int]:
        """All states reachable from ``states`` via ε-transitions."""
        seen = set(states)
        stack = list(states)
        while stack:
            s = stack.pop()
            for label, t in self.transitions.get(s, ()):
                if label is EPS and t not in seen:
                    seen.add(t)
                    stack.append(t)
        return frozenset(seen)

    def step(self, states: frozenset[int], label: str) -> frozenset[int]:
        """One symbol-consuming move (followed by ε-closure)."""
        nxt = {
            t
            for s in states
            for lbl, t in self.transitions.get(s, ())
            if lbl == label
        }
        return self.eps_closure(frozenset(nxt))

    def accepts(self, word: list[str] | tuple[str, ...]) -> bool:
        cur = self.eps_closure(frozenset({self.start}))
        for label in word:
            cur = self.step(cur, label)
            if not cur:
                return False
        return self.accept in cur


def thompson(node: Regex) -> NFA:
    """Build a Thompson NFA for ``node``; states are numbered densely."""
    counter = 0
    transitions: dict[int, list[tuple[str | None, int]]] = {}

    def new_state() -> int:
        nonlocal counter
        s = counter
        counter += 1
        transitions.setdefault(s, [])
        return s

    def add(s: int, label: str | None, t: int) -> None:
        transitions.setdefault(s, []).append((label, t))

    def build(n: Regex) -> tuple[int, int]:
        if isinstance(n, Epsilon):
            s, t = new_state(), new_state()
            add(s, EPS, t)
            return s, t
        if isinstance(n, Sym):
            s, t = new_state(), new_state()
            add(s, n.label, t)
            return s, t
        if isinstance(n, Concat):
            ls, la = build(n.left)
            rs, ra = build(n.right)
            add(la, EPS, rs)
            return ls, ra
        if isinstance(n, Alt):
            s, t = new_state(), new_state()
            ls, la = build(n.left)
            rs, ra = build(n.right)
            add(s, EPS, ls)
            add(s, EPS, rs)
            add(la, EPS, t)
            add(ra, EPS, t)
            return s, t
        if isinstance(n, Star):
            s, t = new_state(), new_state()
            isrt, ia = build(n.inner)
            add(s, EPS, isrt)
            add(s, EPS, t)
            add(ia, EPS, isrt)
            add(ia, EPS, t)
            return s, t
        if isinstance(n, Plus):
            # R+ = R ∘ R* without duplicating the subexpression: loop back.
            s, t = new_state(), new_state()
            isrt, ia = build(n.inner)
            add(s, EPS, isrt)
            add(ia, EPS, isrt)
            add(ia, EPS, t)
            return s, t
        if isinstance(n, Opt):
            s, t = new_state(), new_state()
            isrt, ia = build(n.inner)
            add(s, EPS, isrt)
            add(s, EPS, t)
            add(ia, EPS, t)
            return s, t
        raise TypeError(f"unknown regex node {n!r}")

    start, accept = build(node)
    return NFA(start=start, accept=accept, transitions=transitions)
