"""Unit tests for the RPQ parser (repro.rpq.parser)."""
import pytest

from repro.rpq.ast import Concat, Epsilon, Label, Plus, Star, Union
from repro.rpq.parser import RPQSyntaxError, parse


@pytest.mark.parametrize(
    "text,canon",
    [
        ("a", "a"),
        ("eps", "eps"),
        ("a.b", "(a.b)"),
        ("a.b.c", "(a.b.c)"),
        ("a|b", "(a|b)"),
        ("a|b|c", "(a|b|c)"),
        ("a+", "(a)+"),
        ("a*", "(a)*"),
        ("(a.b)+", "((a.b))+"),
        ("(a|b).c", "((a|b).c)"),
        ("a.(a.b)+.b", "(a.((a.b))+.b)"),
        ("(a.b)*.b+.(a.b+.c)+", "(((a.b))*.(b)+.((a.(b)+.c))+)"),
        ("d.(b.c)+.c", "(d.((b.c))+.c)"),
        ("a.b | c.d", "((a.b)|(c.d))"),
        ("((a))", "a"),
        ("a . b", "(a.b)"),
        (" a ", "a"),
        ("a+*", "((a)+)*"),
        ("a++", "((a)+)+"),
        ("label_1.label_2", "(label_1.label_2)"),
        ("eps.a", "a"),
        ("a|eps", "(a|eps)"),
        ("(a|b)+", "((a|b))+"),
        ("(a.(b|c))*", "((a.(b|c)))*"),
    ],
)
def test_parse_canon(text, canon):
    assert parse(text).canon() == canon


@pytest.mark.parametrize(
    "text,node_type",
    [
        ("a", Label),
        ("eps", Epsilon),
        ("a.b", Concat),
        ("a|b", Union),
        ("a+", Plus),
        ("a*", Star),
    ],
)
def test_parse_node_types(text, node_type):
    assert isinstance(parse(text), node_type)


def test_precedence_postfix_binds_tightest(self=None):
    # a.b+ is a . (b+), not (a.b)+
    node = parse("a.b+")
    assert isinstance(node, Concat)
    assert isinstance(node.parts[1], Plus)


def test_precedence_concat_over_union():
    node = parse("a.b|c")
    assert isinstance(node, Union)
    assert node.canon() == "((a.b)|c)"


def test_union_dedupe():
    assert parse("a|a").canon() == "a"


@pytest.mark.parametrize(
    "bad",
    [
        "",
        "   ",
        "a..b",
        "a.",
        ".a",
        "|a",
        "a|",
        "(a",
        "a)",
        "()",
        "+",
        "*a",
        "a b",
        "a-b",
        "a&b",
    ],
)
def test_parse_errors(bad):
    with pytest.raises(RPQSyntaxError):
        parse(bad)


def test_parse_roundtrip_canon_is_stable():
    for text in ["a.(a.b)+.b", "(a|b).(c.d)*|e+", "d.(b.c)+.c"]:
        once = parse(text).canon()
        assert parse(once).canon() == once
