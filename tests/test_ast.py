"""Unit tests for the regex AST (repro.rpq.ast)."""
import pytest

from repro.rpq.ast import (
    EPSILON,
    Concat,
    Epsilon,
    Label,
    Plus,
    Star,
    Union,
    concat,
    union,
)


class TestCanon:
    def test_label(self):
        assert Label("a").canon() == "a"

    def test_epsilon(self):
        assert Epsilon().canon() == "eps"

    def test_concat(self):
        assert Concat((Label("a"), Label("b"))).canon() == "(a.b)"

    def test_union(self):
        assert Union((Label("a"), Label("b"))).canon() == "(a|b)"

    def test_plus(self):
        assert Plus(Label("a")).canon() == "(a)+"

    def test_star(self):
        assert Star(Concat((Label("a"), Label("b")))).canon() == "((a.b))*"

    def test_canon_is_cache_key(self):
        a1 = Concat((Label("a"), Label("b")))
        a2 = Concat((Label("a"), Label("b")))
        assert a1 == a2 and a1.canon() == a2.canon()


class TestNullable:
    @pytest.mark.parametrize(
        "node,expected",
        [
            (Label("a"), False),
            (EPSILON, True),
            (Star(Label("a")), True),
            (Plus(Label("a")), False),
            (Plus(Star(Label("a"))), True),
            (Concat((Label("a"), Star(Label("b")))), False),
            (Concat((Star(Label("a")), Star(Label("b")))), True),
            (Union((Label("a"), Star(Label("b")))), True),
            (Union((Label("a"), Label("b"))), False),
        ],
    )
    def test_nullable(self, node, expected):
        assert node.nullable() is expected


class TestLabels:
    def test_collects_all(self):
        node = Concat((Label("a"), Plus(Union((Label("b"), Label("c"))))))
        assert node.labels() == {"a", "b", "c"}

    def test_epsilon_empty(self):
        assert EPSILON.labels() == frozenset()


class TestHasClosure:
    @pytest.mark.parametrize(
        "node,expected",
        [
            (Label("a"), False),
            (EPSILON, False),
            (Plus(Label("a")), True),
            (Star(Label("a")), True),
            (Concat((Label("a"), Label("b"))), False),
            (Concat((Label("a"), Plus(Label("b")))), True),
            (Union((Label("a"), Star(Label("b")))), True),
        ],
    )
    def test_has_closure(self, node, expected):
        assert node.has_closure() is expected


class TestSmartConstructors:
    def test_concat_flattens(self):
        c = concat(Label("a"), concat(Label("b"), Label("c")))
        assert c.canon() == "(a.b.c)"

    def test_concat_drops_epsilon(self):
        assert concat(Label("a"), EPSILON, Label("b")).canon() == "(a.b)"

    def test_concat_empty_is_epsilon(self):
        assert concat() is EPSILON

    def test_concat_single(self):
        assert concat(Label("a")) == Label("a")

    def test_union_flattens_and_dedupes(self):
        u = union(Label("a"), union(Label("b"), Label("a")))
        assert u.canon() == "(a|b)"

    def test_union_single(self):
        assert union(Label("a")) == Label("a")

    def test_union_empty_raises(self):
        with pytest.raises(ValueError):
            union()

    def test_concat_requires_two_parts(self):
        with pytest.raises(ValueError):
            Concat((Label("a"),))

    def test_union_requires_two_parts(self):
        with pytest.raises(ValueError):
            Union((Label("a"),))
