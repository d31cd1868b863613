"""Recursive-descent parser for RPQ regular expressions.

Grammar (whitespace ignored)::

    union   := concat ('|' concat)*
    concat  := postfix ('.' postfix)*
    postfix := atom ('+' | '*')*
    atom    := LABEL | 'eps' | '(' union ')'
    LABEL   := [A-Za-z_][A-Za-z0-9_]*

``eps`` is the reserved name for the empty word ε. Examples from the
paper parse as ``a.(a.b)+.b`` and ``(a.b)*.b+.(a.b+.c)+``.
"""
from __future__ import annotations

import re

from repro.rpq.ast import EPSILON, Label, Plus, Regex, Star, concat, union

_TOKEN = re.compile(r"\s*([A-Za-z_][A-Za-z0-9_]*|[().|+*])")


class RPQSyntaxError(ValueError):
    """Raised when an RPQ string cannot be parsed."""


class _Parser:
    def __init__(self, text: str):
        self.text = text
        self.tokens = self._tokenize(text)
        self.pos = 0

    @staticmethod
    def _tokenize(text: str) -> list[str]:
        tokens: list[str] = []
        i = 0
        while i < len(text):
            m = _TOKEN.match(text, i)
            if not m:
                if text[i:].strip():
                    raise RPQSyntaxError(
                        f"unexpected character {text[i:].strip()[0]!r} in {text!r}"
                    )
                break
            tokens.append(m.group(1))
            i = m.end()
        return tokens

    def _peek(self) -> str | None:
        return self.tokens[self.pos] if self.pos < len(self.tokens) else None

    def _next(self) -> str:
        tok = self._peek()
        if tok is None:
            raise RPQSyntaxError(f"unexpected end of query in {self.text!r}")
        self.pos += 1
        return tok

    def parse(self) -> Regex:
        node = self._union()
        if self._peek() is not None:
            raise RPQSyntaxError(
                f"trailing tokens {self.tokens[self.pos:]} in {self.text!r}"
            )
        return node

    def _union(self) -> Regex:
        parts = [self._concat()]
        while self._peek() == "|":
            self._next()
            parts.append(self._concat())
        return union(*parts)

    def _concat(self) -> Regex:
        parts = [self._postfix()]
        while self._peek() == ".":
            self._next()
            parts.append(self._postfix())
        return concat(*parts)

    def _postfix(self) -> Regex:
        node = self._atom()
        while self._peek() in ("+", "*"):
            op = self._next()
            node = Plus(node) if op == "+" else Star(node)
        return node

    def _atom(self) -> Regex:
        tok = self._next()
        if tok == "(":
            node = self._union()
            if self._next() != ")":
                raise RPQSyntaxError(f"missing ')' in {self.text!r}")
            return node
        if tok in (")", ".", "|", "+", "*"):
            raise RPQSyntaxError(f"unexpected {tok!r} in {self.text!r}")
        if tok == "eps":
            return EPSILON
        return Label(tok)


def parse(text: str) -> Regex:
    """Parse an RPQ string into a :class:`~repro.rpq.ast.Regex`."""
    if not text.strip():
        raise RPQSyntaxError("empty query")
    return _Parser(text).parse()
