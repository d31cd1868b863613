"""Shared test helpers: paper example graph, SQL builders, edge gens."""
from __future__ import annotations

import pandas as pd

from repro.pyref import Edge

# Engineered so that G_{b.c} has exactly the Fig. 5 edge set
# {(2,4),(2,6),(3,5),(4,2),(5,3)} — the paper's running example. The d/e
# edges support Pre/Post-style batch-unit queries around (b.c)+.
PAPER_EDGES: list[Edge] = [
    (2, "b", 1),
    (3, "b", 8),
    (4, "b", 9),
    (5, "b", 10),
    (1, "c", 4),
    (1, "c", 6),
    (8, "c", 5),
    (9, "c", 2),
    (10, "c", 3),
    (7, "d", 4),
    (7, "d", 2),
    (6, "e", 7),
    (4, "e", 11),
]


def random_labeled_edges(
    *, n_vertices: int, n_edges: int, labels: str, seed: int
) -> list[Edge]:
    """Deterministic random edge list for differential tests."""
    import random

    rng = random.Random(seed)
    out = set()
    while len(out) < n_edges:
        s = rng.randrange(n_vertices)
        d = rng.randrange(n_vertices)
        out.add((s, rng.choice(labels), d))
    return sorted(out)


def edges_pdf(edges: list[Edge]) -> pd.DataFrame:
    """Edge list as pandas, for registering with the DuckDB oracle."""
    return pd.DataFrame(edges, columns=["src", "label", "dst"])


def batch_unit_sql(
    pre: list[str], r: list[str], kind: str | None, post: list[str]
) -> str:
    """DuckDB SQL evaluating ``Pre · R{kind} · Post`` over table ``edges``.

    ``pre``/``r``/``post`` are label sequences (concatenations); ``kind``
    is '+', '*' or None (no closure: the query is just pre+post labels).
    Uses a recursive CTE for the Kleene closure — an implementation
    completely independent of the Spark pipelines under test.
    """

    def chain(labels: list[str], name: str) -> str:
        # (start_v, end_v) pairs for a label concatenation.
        if not labels:
            raise ValueError("empty chain")
        froms = ", ".join(f"edges e{i}" for i in range(len(labels)))
        conds = [
            f"e{i}.label = '{lab}'" for i, lab in enumerate(labels)
        ] + [
            f"e{i}.dst = e{i + 1}.src" for i in range(len(labels) - 1)
        ]
        last = len(labels) - 1
        return (
            f"{name} AS (SELECT DISTINCT e0.src AS s, e{last}.dst AS d "
            f"FROM {froms} WHERE {' AND '.join(conds)})"
        )

    if kind is None:
        seq = pre + r + post
        return (
            f"WITH {chain(seq, 'p')} "
            "SELECT s AS start_v, d AS end_v FROM p"
        )

    ctes = [chain(r, "r")]
    ctes.append(
        "tc AS (SELECT s, d FROM r UNION "
        "SELECT tc.s, r.d FROM tc JOIN r ON tc.d = r.s)"
    )
    ctes.append(
        "verts AS (SELECT src AS v FROM edges UNION SELECT dst FROM edges)"
    )
    if kind == "*":
        ctes.append(
            "clo AS (SELECT s, d FROM tc UNION SELECT v, v FROM verts)"
        )
    else:
        ctes.append("clo AS (SELECT s, d FROM tc)")
    if pre:
        ctes.append(chain(pre, "pre"))
        core = (
            "SELECT pre.s AS s, clo.d AS d FROM pre "
            "JOIN clo ON pre.d = clo.s"
        )
        if kind == "*":
            core += " UNION SELECT s, d FROM pre"
    else:
        core = "SELECT s, d FROM clo"
    ctes.append(f"core AS ({core})")
    if post:
        ctes.append(chain(post, "post"))
        final = (
            "SELECT DISTINCT core.s AS start_v, post.d AS end_v "
            "FROM core JOIN post ON core.d = post.s"
        )
    else:
        final = "SELECT DISTINCT s AS start_v, d AS end_v FROM core"
    return "WITH RECURSIVE " + ", ".join(ctes) + " " + final
