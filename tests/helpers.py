"""Shared test utilities: random graphs, a Definition-5 checker, a
reference (driver-side) assembler, and a DuckDB match oracle."""
from __future__ import annotations

import duckdb
import numpy as np
import pandas as pd

from repro.core.query import Query, is_var, var_col
from repro.oracle_bgp import bgp_to_sql


def random_triples(
    rng: np.random.Generator, *, n_vertices: int = 14, n_edges: int = 30,
    preds=("p", "q", "r"),
) -> pd.DataFrame:
    rows = set()
    while len(rows) < n_edges:
        s = f"n{rng.integers(n_vertices)}"
        o = f"n{rng.integers(n_vertices)}"
        if s == o:
            continue
        rows.add((s, str(rng.choice(list(preds))), o))
    return pd.DataFrame(sorted(rows), columns=["s", "p", "o"])


def random_partition(rng: np.random.Generator, triples: pd.DataFrame, k: int) -> pd.DataFrame:
    verts = sorted(set(triples["s"]) | set(triples["o"]))
    return pd.DataFrame(
        {"v": verts, "frag": [int(rng.integers(k)) for _ in verts]}
    )


def oracle_rows(triples_pdf: pd.DataFrame, query: Query) -> set[tuple]:
    """DISTINCT variable bindings from DuckDB over the global triples."""
    con = duckdb.connect()
    try:
        con.register("triples", triples_pdf)
        rows = con.execute(bgp_to_sql(query)).fetchall()
    finally:
        con.close()
    return set(map(tuple, rows))


def pm_bindings(pm: dict, query: Query) -> tuple:
    """Variable-binding tuple of a (complete) PM record."""
    vals = [pm[f"m_{query.vertex_index[v]}"] for v in query.vertex_vars]
    vals += [pm[f"pv_{var_col(v)}"] for v in query.pred_vars]
    return tuple(vals)


# ---------------------------------------------------------------------------
# Independent Definition-5 checker
# ---------------------------------------------------------------------------

def check_def5(pm: dict, query: Query, rows, frag: int) -> None:
    """Assert the six conditions of Definition 5 on an emitted PM record.

    ``rows`` is the fragment's (s, p, o, s_frag, o_frag) edge list. This is
    a from-scratch re-implementation (not shared with the enumerator) used
    to cross-check its output.
    """
    home: dict[str, int] = {}
    edges = set()
    for s, p, o, sf, of in rows:
        home[s] = sf
        home[o] = of
        edges.add((s, p, o))

    n = query.n_vertices
    f = [pm[f"m_{i}"] for i in range(n)]
    internal = [u is not None and home[u] == frag for u in f]

    # conditions 1 & 2: binding feasibility
    for i, term in enumerate(query.vertices):
        if f[i] is None:
            continue
        if not is_var(term):
            assert f[i] == term, (term, f[i])
        assert f[i] in home, f"{f[i]} not in fragment {frag}"

    # which query edges are matched by actual data edges?
    matched = {}
    for e in query.edges:
        a, b = f[e.si], f[e.oi]
        if a is None or b is None:
            continue
        pred = pm.get(f"pv_{var_col(e.p)}") if is_var(e.p) else e.p
        if pred is not None and (a, pred, b) in edges:
            matched[e.idx] = (a, pred, b)

    # condition 3: every unmatched edge has a NULL endpoint or two
    # extended endpoints
    for e in query.edges:
        if e.idx in matched:
            continue
        a, b = f[e.si], f[e.oi]
        if a is None or b is None:
            continue
        assert not internal[e.si] and not internal[e.oi], (
            f"unmatched edge {e.idx} with an internal endpoint"
        )

    # condition 4: at least one crossing edge among matched edges,
    # and the emitted cmap lists exactly the matched crossing edges
    crossing = {
        (s, p, o)
        for (s, p, o) in matched.values()
        if home[s] != home[o]
    }
    assert crossing, "PM without a crossing edge"
    got_cmap = set(pm["cmap"])
    want_cmap = {
        f"{idx}##{s}|{p}|{o}"
        for idx, (s, p, o) in matched.items()
        if home[s] != home[o]
    }
    assert got_cmap == want_cmap

    # condition 5: internally-bound vertices have all incident edges matched
    for i in range(n):
        if not internal[i]:
            continue
        for e in query.incident_edges(i):
            assert e.idx in matched, (
                f"internal vertex {i} with unmatched incident edge {e.idx}"
            )

    # condition 6: internal preimages weakly connected via internal vertices
    internal_idx = [i for i in range(n) if internal[i]]
    if len(internal_idx) > 1:
        adj = {i: set() for i in internal_idx}
        for e in query.edges:
            if e.idx in matched and internal[e.si] and internal[e.oi]:
                adj[e.si].add(e.oi)
                adj[e.oi].add(e.si)
        seen = {internal_idx[0]}
        stack = [internal_idx[0]]
        while stack:
            for w in adj[stack.pop()]:
                if w not in seen:
                    seen.add(w)
                    stack.append(w)
        assert seen == set(internal_idx), "condition 6 violated"

    # LECSign consistency
    sign = sum(1 << i for i in range(n) if internal[i])
    assert sign == pm["sign"]


# ---------------------------------------------------------------------------
# Reference assembler (pure Python, brute force)
# ---------------------------------------------------------------------------

def reference_assemble(pms: list[dict], query: Query) -> set[tuple]:
    """All crossing matches obtainable by joining PMs (Theorem 4), as
    DISTINCT binding tuples. Exponential worklist — test-scale only."""
    n = query.n_vertices
    pv_cols = [f"pv_{var_col(v)}" for v in query.pred_vars]

    def state_of(pm):
        return (
            pm["sign"],
            frozenset(pm["cmap"]),
            tuple(pm[f"m_{i}"] for i in range(n)),
            tuple(pm.get(c) for c in pv_cols),
        )

    def qe_map(entries):
        out = {}
        for e in entries:
            qe, edge = e.split("##", 1)
            out[qe] = edge
        return out

    base = {state_of(pm) for pm in pms}
    seen = set(base)
    queue = list(base)
    full = query.full_sign
    results: set[tuple] = set()
    while queue:
        sign, entries, f, pv = queue.pop()
        if sign == full:
            vals = tuple(
                f[query.vertex_index[v]] for v in query.vertex_vars
            ) + pv
            results.add(vals)
            continue
        smap = qe_map(entries)
        for osign, oentries, of, opv in base:
            if sign & osign:
                continue
            omap = qe_map(oentries)
            shared = False
            ok = True
            for qe, edge in smap.items():
                other = omap.get(qe)
                if other is None:
                    continue
                if other != edge:
                    ok = False
                    break
                shared = True
            if not (shared and ok):
                continue
            if any(
                a is not None and b is not None and a != b
                for a, b in zip(f, of)
            ):
                continue
            if any(
                a is not None and b is not None and a != b
                for a, b in zip(pv, opv)
            ):
                continue
            merged = (
                sign | osign,
                entries | oentries,
                tuple(a if a is not None else b for a, b in zip(f, of)),
                tuple(a if a is not None else b for a, b in zip(pv, opv)),
            )
            if merged not in seen:
                seen.add(merged)
                queue.append(merged)
    return results


def local_matches(
    triples_pdf: pd.DataFrame, vertex_frag_pdf: pd.DataFrame, query: Query
) -> set[tuple]:
    """Matches findable inside a single fragment's replicated view, via the
    DuckDB oracle applied per fragment."""
    from repro.rdf.graph import fragment_edges_pdf

    fe = fragment_edges_pdf(triples_pdf, vertex_frag_pdf)
    out: set[tuple] = set()
    for frag in sorted(fe["frag"].unique()):
        sub = fe[fe["frag"] == frag][["s", "p", "o"]]
        out |= oracle_rows(sub, query)
    return out
