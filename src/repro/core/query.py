"""SPARQL BGP query model (paper Definition 2).

A BGP query is a multigraph over *query vertices* (variables like ``?x`` or
constants — URIs / literals) with labelled directed edges (triple patterns).
Predicates may themselves be variables.

Terms are plain strings; a term starting with ``?`` is a variable, anything
else is a constant. Query vertices are ordered (``vertex_order``), which fixes
the bit positions of the LECSign bitstring (Definition 8) and the
``m_<i>`` binding-column layout used throughout the pipeline.
"""
from __future__ import annotations

import re
from dataclasses import dataclass
from typing import Sequence


def is_var(term: str) -> bool:
    """True iff ``term`` is a SPARQL variable (``?``-prefixed)."""
    return term.startswith("?")


def var_col(term: str) -> str:
    """Sanitized DataFrame column name for a variable term.

    ``?p1`` → ``p1``. Non-alphanumeric characters are replaced so the name is
    usable both as a Spark column and as a SQL alias in the DuckDB oracle.
    """
    assert is_var(term), term
    return re.sub(r"\W", "_", term[1:])


@dataclass(frozen=True)
class TriplePattern:
    """One triple pattern ``(s, p, o)``; each component a term string."""

    s: str
    p: str
    o: str

    def terms(self) -> tuple[str, str, str]:
        return (self.s, self.p, self.o)


@dataclass(frozen=True)
class QueryEdge:
    """A query-graph edge: pattern index plus endpoint vertex indices."""

    idx: int  # index into Query.patterns; identifies the edge ("qe")
    si: int  # vertex index of the subject
    oi: int  # vertex index of the object
    p: str  # predicate term (constant or variable)


class Query:
    """A connected BGP query graph.

    Parameters
    ----------
    patterns:
        Triple patterns; subjects/objects become query vertices.
    name:
        Display name used in tables (e.g. ``LQ1``).
    vertex_order:
        Optional explicit ordering of the query vertices (to pin LECSign bit
        positions, e.g. to mirror the paper's running example). Must be a
        permutation of the vertices appearing in the patterns.
    selective:
        Whether the paper would flag this query as containing *selective*
        triple patterns (√ column of Tables I/III). Defaults to "has a
        constant subject/object".
    """

    def __init__(
        self,
        patterns: Sequence[TriplePattern | tuple],
        *,
        name: str = "Q",
        vertex_order: Sequence[str] | None = None,
        selective: bool | None = None,
    ):
        self.name = name
        self.patterns: list[TriplePattern] = [
            p if isinstance(p, TriplePattern) else TriplePattern(*p) for p in patterns
        ]
        if not self.patterns:
            raise ValueError("a BGP query needs at least one triple pattern")

        seen: dict[str, int] = {}
        for tp in self.patterns:
            for t in (tp.s, tp.o):
                if t not in seen:
                    seen[t] = len(seen)
        if vertex_order is not None:
            if sorted(vertex_order) != sorted(seen):
                raise ValueError("vertex_order must be a permutation of the vertices")
            self.vertices: list[str] = list(vertex_order)
        else:
            self.vertices = list(seen)
        self.vertex_index: dict[str, int] = {v: i for i, v in enumerate(self.vertices)}

        self.edges: list[QueryEdge] = [
            QueryEdge(i, self.vertex_index[tp.s], self.vertex_index[tp.o], tp.p)
            for i, tp in enumerate(self.patterns)
        ]
        self.vertex_vars: list[str] = [v for v in self.vertices if is_var(v)]
        self.pred_vars: list[str] = []
        for tp in self.patterns:
            if is_var(tp.p) and tp.p not in self.pred_vars:
                if tp.p in self.vertex_index:
                    raise ValueError(f"term {tp.p} used both as vertex and predicate")
                self.pred_vars.append(tp.p)
        self.variables: list[str] = self.vertex_vars + self.pred_vars
        if selective is None:
            selective = any(not is_var(t) for t in self.vertices)
        self.selective = bool(selective)
        if not self._connected():
            raise ValueError("query graph must be connected (paper §II-A)")

    # ---- structure ------------------------------------------------------

    def _connected(self) -> bool:
        n = len(self.vertices)
        parent = list(range(n))

        def find(a: int) -> int:
            while parent[a] != a:
                parent[a] = parent[parent[a]]
                a = parent[a]
            return a

        for e in self.edges:
            ra, rb = find(e.si), find(e.oi)
            parent[ra] = rb
        return len({find(i) for i in range(n)}) == 1

    @property
    def n_vertices(self) -> int:
        return len(self.vertices)

    @property
    def full_sign(self) -> int:
        """LECSign bitmask with a '1' for every query vertex (Theorem 4.3)."""
        return (1 << self.n_vertices) - 1

    def incident_edges(self, vi: int) -> list[QueryEdge]:
        """Query edges incident to vertex index ``vi`` (either endpoint)."""
        return [e for e in self.edges if e.si == vi or e.oi == vi]

    def is_star(self) -> bool:
        """True iff the query is a subject-centred star: every pattern
        shares the same subject and the objects are pairwise-distinct
        leaves (no parallel edges, no self-loop).

        This is the paper's star-query class (LQ2/LQ4/LQ5, BQ1–BQ3): the
        centre's incident edges — including replicated crossing edges — all
        live in the centre's home fragment, so star matches never span
        fragments and are evaluated locally with zero communication
        (§VIII-B). Object-shared paths (LQ7, YQ3) and parallel-edge cycles
        (YQ2's ``?a actedIn/directed ?m``) are *not* stars in the paper's
        tables and go through the partial-evaluation machinery.
        """
        if len({e.si for e in self.edges}) != 1:
            return False
        center = self.edges[0].si
        objects = [e.oi for e in self.edges]
        return len(set(objects)) == len(objects) and center not in objects

    # ---- output layout --------------------------------------------------

    def binding_columns(self) -> list[str]:
        """Result-DataFrame column names: one per variable, in order."""
        return [var_col(v) for v in self.variables]

    def sign_str(self, sign: int) -> str:
        """Render a LECSign bitmask as the paper's bitstring, e.g. [00101]."""
        return "[" + "".join(
            "1" if sign >> i & 1 else "0" for i in range(self.n_vertices)
        ) + "]"

    def __repr__(self) -> str:  # pragma: no cover - debugging aid
        return f"Query({self.name}, {len(self.patterns)} patterns)"
