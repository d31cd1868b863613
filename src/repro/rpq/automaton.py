"""NFA construction for RPQs (Thompson construction + ε-elimination).

The Yakovets-style evaluators traverse the graph while pattern matching
with a finite automaton (paper Section II-B). We build a Thompson NFA
from the regex AST, then eliminate ε-transitions so that the Spark-side
product traversal only deals with labeled transitions
``(state, label, state)``.
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.rpq.ast import Concat, Epsilon, Label, Plus, Regex, Star, Union


@dataclass(frozen=True)
class NFA:
    """ε-free NFA. ``accepts_epsilon`` records whether ε ∈ L(R)."""

    n_states: int
    start: int
    accepts: frozenset[int]
    transitions: tuple[tuple[int, str, int], ...]
    accepts_epsilon: bool

    def accepts_word(self, word: tuple[str, ...] | list[str]) -> bool:
        """Simulate the NFA on a label sequence (driver-side oracle)."""
        if not word:
            return self.accepts_epsilon
        current = {self.start}
        by_state_label: dict[tuple[int, str], set[int]] = {}
        for q, a, q2 in self.transitions:
            by_state_label.setdefault((q, a), set()).add(q2)
        for a in word:
            nxt: set[int] = set()
            for q in current:
                nxt |= by_state_label.get((q, a), set())
            current = nxt
            if not current:
                return False
        return bool(current & self.accepts)


class _Builder:
    """Thompson construction producing (start, accept) fragment pairs."""

    def __init__(self) -> None:
        self.n = 0
        self.eps: list[tuple[int, int]] = []
        self.lab: list[tuple[int, str, int]] = []

    def new_state(self) -> int:
        self.n += 1
        return self.n - 1

    def build(self, node: Regex) -> tuple[int, int]:
        if isinstance(node, Epsilon):
            s, t = self.new_state(), self.new_state()
            self.eps.append((s, t))
            return s, t
        if isinstance(node, Label):
            s, t = self.new_state(), self.new_state()
            self.lab.append((s, node.name, t))
            return s, t
        if isinstance(node, Concat):
            first_s, prev_t = self.build(node.parts[0])
            for p in node.parts[1:]:
                s, t = self.build(p)
                self.eps.append((prev_t, s))
                prev_t = t
            return first_s, prev_t
        if isinstance(node, Union):
            s, t = self.new_state(), self.new_state()
            for p in node.parts:
                ps, pt = self.build(p)
                self.eps.append((s, ps))
                self.eps.append((pt, t))
            return s, t
        if isinstance(node, Plus):
            bs, bt = self.build(node.body)
            s, t = self.new_state(), self.new_state()
            self.eps.extend([(s, bs), (bt, t), (bt, bs)])
            return s, t
        if isinstance(node, Star):
            bs, bt = self.build(node.body)
            s, t = self.new_state(), self.new_state()
            self.eps.extend([(s, bs), (bt, t), (bt, bs), (s, t)])
            return s, t
        raise TypeError(f"unknown regex node {node!r}")


def build_nfa(node: Regex) -> NFA:
    """Build an ε-free NFA for ``node`` via Thompson + ε-closure.

    ε-elimination: for every state q, every labeled transition
    ``(p, a, r)`` with p ∈ εclosure(q) yields ``(q, a, r')`` for each
    r' — we keep r and let acceptance use ε-closure-adjusted accept set
    (a state is accepting if its ε-closure contains the accept state).
    Unreachable states are pruned and states renumbered densely.
    """
    b = _Builder()
    start, accept = b.build(node)

    # ε-closures via simple worklist (state counts here are tiny).
    closure: list[set[int]] = [{q} for q in range(b.n)]
    changed = True
    while changed:
        changed = False
        for p, q in b.eps:
            new = closure[q] - closure[p]
            if new:
                closure[p] |= new
                changed = True

    transitions: set[tuple[int, str, int]] = set()
    for q in range(b.n):
        for p in closure[q]:
            for src, a, dst in b.lab:
                if src == p:
                    transitions.add((q, a, dst))
    accepts = frozenset(q for q in range(b.n) if accept in closure[q])
    accepts_epsilon = accept in closure[start]

    # Prune states unreachable from start over labeled transitions.
    reach = {start}
    frontier = {start}
    by_src: dict[int, list[tuple[str, int]]] = {}
    for q, a, q2 in transitions:
        by_src.setdefault(q, []).append((a, q2))
    while frontier:
        nxt: set[int] = set()
        for q in frontier:
            for _, q2 in by_src.get(q, []):
                if q2 not in reach:
                    reach.add(q2)
                    nxt.add(q2)
        frontier = nxt
    renum = {q: i for i, q in enumerate(sorted(reach))}
    return NFA(
        n_states=len(renum),
        start=renum[start],
        accepts=frozenset(renum[q] for q in accepts if q in renum),
        transitions=tuple(
            sorted(
                (renum[q], a, renum[q2])
                for q, a, q2 in transitions
                if q in renum and q2 in renum
            )
        ),
        accepts_epsilon=accepts_epsilon,
    )
