"""Compile a BGP query to SQL over a plain ``triples(s, p, o)`` table.

The generated SQL is the ground-truth semantics for the whole reproduction:
every engine path (gStore^D variants, the star path, S2RDF-lite) must return
exactly the DISTINCT variable bindings this query yields on DuckDB over the
*unpartitioned* triple set. Used with :func:`repro.oracle.assert_equivalent`.
"""
from __future__ import annotations

from repro.core.query import Query, is_var, var_col


def _quote(value: str) -> str:
    return "'" + value.replace("'", "''") + "'"


def bgp_to_sql(query: Query, table: str = "triples") -> str:
    """SQL self-join equivalent of ``query`` over ``table(s, p, o)``.

    Each triple pattern scans the table once; shared variables become join
    predicates; constants become equality filters. The projection is
    ``SELECT DISTINCT`` over every variable (vertex and predicate variables),
    aliased with :func:`var_col` so Spark and DuckDB column names agree.
    """
    where: list[str] = []
    first_ref: dict[str, str] = {}  # variable term -> first column reference
    for i, tp in enumerate(query.patterns):
        for col, term in (("s", tp.s), ("p", tp.p), ("o", tp.o)):
            ref = f"t{i}.{col}"
            if is_var(term):
                if term in first_ref:
                    where.append(f"{ref} = {first_ref[term]}")
                else:
                    first_ref[term] = ref
            else:
                where.append(f"{ref} = {_quote(term)}")
    select = ", ".join(
        f"{first_ref[v]} AS {var_col(v)}" for v in query.variables
    )
    if not select:  # fully ground pattern: expose a constant marker column
        select = "1 AS matched"
    frm = ", ".join(f"{table} t{i}" for i in range(len(query.patterns)))
    sql = f"SELECT DISTINCT {select} FROM {frm}"
    if where:
        sql += " WHERE " + " AND ".join(where)
    return sql
