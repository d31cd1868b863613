"""Regex AST for regular path queries.

Nodes are immutable and hashable so they can key RTC caches. The
canonical string (``canon``) is the cache key: two structurally equal
regexes share one RTC (e.g. the ``a.b`` inside ``a.(a.b)+.b`` and inside
``(a.b)*.b+`` in the paper's Example 7).
"""
from __future__ import annotations

from dataclasses import dataclass, field


class Regex:
    """Base class for regex AST nodes."""

    def canon(self) -> str:
        """Canonical, fully parenthesized string — used as the cache key."""
        raise NotImplementedError

    def nullable(self) -> bool:
        """Whether the language of this regex contains the empty word."""
        raise NotImplementedError

    def labels(self) -> frozenset[str]:
        """All edge labels mentioned in the regex."""
        raise NotImplementedError

    def has_closure(self) -> bool:
        """Whether the regex contains a Kleene plus or star anywhere."""
        raise NotImplementedError

    def __str__(self) -> str:  # pragma: no cover - delegates
        return self.canon()


@dataclass(frozen=True)
class Epsilon(Regex):
    """The empty word ε."""

    def canon(self) -> str:
        return "eps"

    def nullable(self) -> bool:
        return True

    def labels(self) -> frozenset[str]:
        return frozenset()

    def has_closure(self) -> bool:
        return False


EPSILON = Epsilon()


@dataclass(frozen=True)
class Label(Regex):
    """A single edge label."""

    name: str

    def canon(self) -> str:
        return self.name

    def nullable(self) -> bool:
        return False

    def labels(self) -> frozenset[str]:
        return frozenset({self.name})

    def has_closure(self) -> bool:
        return False


@dataclass(frozen=True)
class Concat(Regex):
    """Concatenation ``parts[0] . parts[1] . ...`` (at least 2 parts)."""

    parts: tuple[Regex, ...]

    def __post_init__(self) -> None:
        if len(self.parts) < 2:
            raise ValueError("Concat needs >= 2 parts; use the part itself")

    def canon(self) -> str:
        return "(" + ".".join(p.canon() for p in self.parts) + ")"

    def nullable(self) -> bool:
        return all(p.nullable() for p in self.parts)

    def labels(self) -> frozenset[str]:
        return frozenset().union(*(p.labels() for p in self.parts))

    def has_closure(self) -> bool:
        return any(p.has_closure() for p in self.parts)


@dataclass(frozen=True)
class Union(Regex):
    """Alternation ``parts[0] | parts[1] | ...`` (at least 2 parts)."""

    parts: tuple[Regex, ...]

    def __post_init__(self) -> None:
        if len(self.parts) < 2:
            raise ValueError("Union needs >= 2 parts; use the part itself")

    def canon(self) -> str:
        return "(" + "|".join(p.canon() for p in self.parts) + ")"

    def nullable(self) -> bool:
        return any(p.nullable() for p in self.parts)

    def labels(self) -> frozenset[str]:
        return frozenset().union(*(p.labels() for p in self.parts))

    def has_closure(self) -> bool:
        return any(p.has_closure() for p in self.parts)


@dataclass(frozen=True)
class Plus(Regex):
    """Kleene plus ``body+`` — one or more repetitions."""

    body: Regex

    def canon(self) -> str:
        return f"({self.body.canon()})+"

    def nullable(self) -> bool:
        return self.body.nullable()

    def labels(self) -> frozenset[str]:
        return self.body.labels()

    def has_closure(self) -> bool:
        return True


@dataclass(frozen=True)
class Star(Regex):
    """Kleene star ``body*`` — zero or more repetitions."""

    body: Regex

    def canon(self) -> str:
        return f"({self.body.canon()})*"

    def nullable(self) -> bool:
        return True

    def labels(self) -> frozenset[str]:
        return self.body.labels()

    def has_closure(self) -> bool:
        return True


def concat(*parts: Regex) -> Regex:
    """Smart concatenation: flattens nested Concats and drops ε parts."""
    flat: list[Regex] = []
    for p in parts:
        if isinstance(p, Epsilon):
            continue
        if isinstance(p, Concat):
            flat.extend(p.parts)
        else:
            flat.append(p)
    if not flat:
        return EPSILON
    if len(flat) == 1:
        return flat[0]
    return Concat(tuple(flat))


def union(*parts: Regex) -> Regex:
    """Smart alternation: flattens nested Unions and dedupes parts."""
    flat: list[Regex] = []
    seen: set[str] = set()
    for p in parts:
        sub = p.parts if isinstance(p, Union) else (p,)
        for q in sub:
            key = q.canon()
            if key not in seen:
                seen.add(key)
                flat.append(q)
    if not flat:
        raise ValueError("union of zero parts")
    if len(flat) == 1:
        return flat[0]
    return Union(tuple(flat))
