"""Unit tests for NFA construction (repro.rpq.automaton).

The deep check is differential: our ε-free NFA must accept exactly the
same words as Python's ``re`` engine on the equivalent pattern, over
all words up to length 5 — a fully independent implementation.
"""
import itertools
import re as pyre

import pytest

from repro.rpq.ast import Concat, Epsilon, Label, Plus, Regex, Star, Union
from repro.rpq.automaton import build_nfa
from repro.rpq.parser import parse


def to_py_regex(node: Regex) -> str:
    """Translate a (single-char-label) AST to a python re pattern."""
    if isinstance(node, Epsilon):
        return ""
    if isinstance(node, Label):
        assert len(node.name) == 1
        return node.name
    if isinstance(node, Concat):
        return "".join(f"(?:{to_py_regex(p)})" for p in node.parts)
    if isinstance(node, Union):
        return "|".join(f"(?:{to_py_regex(p)})" for p in node.parts)
    if isinstance(node, Plus):
        return f"(?:{to_py_regex(node.body)})+"
    if isinstance(node, Star):
        return f"(?:{to_py_regex(node.body)})*"
    raise TypeError(node)


DIFFERENTIAL_QUERIES = [
    "a",
    "eps",
    "a.b",
    "a|b",
    "a+",
    "a*",
    "(a.b)+",
    "(a.b)*",
    "a.(b.c)+",
    "d.(b.c)+.c",
    "(a|b)+",
    "(a|b)*.c",
    "a.(b|c)*.a",
    "(a.b|c)+",
    "a+.b+",
    "a*.b*",
    "(a+|b)*",
    "a.(a.b)+.b",
    "(a.b)*.b+.(a.b+.c)+",
    "eps|a.b",
    "(a|eps).b",
    "((a.b)+|c*)+",
]


@pytest.mark.parametrize("text", DIFFERENTIAL_QUERIES)
def test_nfa_matches_python_re(text):
    ast = parse(text)
    nfa = build_nfa(ast)
    pattern = pyre.compile(to_py_regex(ast))
    alphabet = sorted(ast.labels()) or ["a"]
    for n in range(6):
        for word in itertools.product(alphabet, repeat=n):
            expected = pattern.fullmatch("".join(word)) is not None
            assert nfa.accepts_word(word) is expected, (text, word)


@pytest.mark.parametrize("text", DIFFERENTIAL_QUERIES)
def test_accepts_epsilon_matches_nullable(text):
    ast = parse(text)
    assert build_nfa(ast).accepts_epsilon is ast.nullable()


class TestStructure:
    def test_label_nfa(self):
        nfa = build_nfa(parse("a"))
        assert nfa.accepts_word(["a"])
        assert not nfa.accepts_word(["b"])
        assert not nfa.accepts_word(["a", "a"])
        assert not nfa.accepts_epsilon

    def test_plus_requires_one(self):
        nfa = build_nfa(parse("(a.b)+"))
        assert not nfa.accepts_epsilon
        assert nfa.accepts_word(list("ab"))
        assert nfa.accepts_word(list("abab"))
        assert not nfa.accepts_word(list("aba"))

    def test_star_accepts_empty(self):
        nfa = build_nfa(parse("(a.b)*"))
        assert nfa.accepts_epsilon
        assert nfa.accepts_word(list("abab"))

    def test_multichar_labels(self):
        nfa = build_nfa(parse("knows.likes+"))
        assert nfa.accepts_word(["knows", "likes"])
        assert nfa.accepts_word(["knows", "likes", "likes"])
        assert not nfa.accepts_word(["knows"])

    def test_states_pruned_and_dense(self):
        nfa = build_nfa(parse("(a.b)+.c"))
        used = {nfa.start} | {q for q, _, _ in nfa.transitions} | {
            q2 for _, _, q2 in nfa.transitions
        }
        assert used == set(range(nfa.n_states))

    def test_transitions_sorted_deterministic(self):
        n1 = build_nfa(parse("a.(b|c)+"))
        n2 = build_nfa(parse("a.(b|c)+"))
        assert n1 == n2
