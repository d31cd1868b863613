"""RPQ front-end: regex AST, parser, DNF conversion, NFA construction."""

from repro.rpq.ast import Concat, Epsilon, Label, Plus, Regex, Star, Union
from repro.rpq.parser import parse
from repro.rpq.dnf import Clause, decompose_clause, to_dnf

__all__ = [
    "Regex",
    "Label",
    "Epsilon",
    "Concat",
    "Union",
    "Star",
    "Plus",
    "parse",
    "Clause",
    "to_dnf",
    "decompose_clause",
]
