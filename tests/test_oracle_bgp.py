"""Unit tests for the BGP → SQL compiler, executed directly on DuckDB."""
import duckdb
import pandas as pd
import pytest

from repro.core.query import Query
from repro.oracle_bgp import bgp_to_sql

TRIPLES = pd.DataFrame(
    [
        ("a", "p", "b"),
        ("b", "q", "c"),
        ("a", "p", "c"),
        ("c", "q", "a"),
        ("x", "p", "x"),
    ],
    columns=["s", "p", "o"],
)


def run(sql: str) -> list[tuple]:
    con = duckdb.connect()
    try:
        con.register("triples", TRIPLES)
        return sorted(map(tuple, con.execute(sql).fetchall()))
    finally:
        con.close()


def test_single_pattern():
    sql = bgp_to_sql(Query([("?s", "p", "?o")]))
    assert run(sql) == [("a", "b"), ("a", "c"), ("x", "x")]


def test_join_on_shared_variable():
    sql = bgp_to_sql(Query([("?s", "p", "?o"), ("?o", "q", "?t")]))
    assert run(sql) == [("a", "b", "c"), ("a", "c", "a")]


def test_constant_subject_and_object():
    sql = bgp_to_sql(Query([("a", "p", "?o")]))
    assert run(sql) == [("b",), ("c",)]
    sql = bgp_to_sql(Query([("?s", "p", "b")]))
    assert run(sql) == [("a",)]


def test_predicate_variable_is_projected():
    # variable order is vertex vars then predicate vars: (?o, ?p)
    sql = bgp_to_sql(Query([("a", "?p", "?o")]))
    assert run(sql) == [("b", "p"), ("c", "p")]


def test_repeated_variable_within_pattern():
    sql = bgp_to_sql(Query([("?s", "p", "?s")]))
    assert run(sql) == [("x",)]


def test_triangle_query():
    sql = bgp_to_sql(
        Query([("?a", "p", "?b"), ("?b", "q", "?c"), ("?a", "p", "?c")])
    )
    # a-p-b, b-q-c, a-p-c is the only triangle
    assert run(sql) == [("a", "b", "c")]


def test_homomorphism_semantics_two_vars_same_vertex():
    # ?a p ?b with ?a = ?b must be allowed (homomorphism, Def 3)
    sql = bgp_to_sql(Query([("?a", "p", "?b"), ("?b", "p", "?c")]))
    assert ("x", "x", "x") in run(sql)


def test_ground_query_marker():
    sql = bgp_to_sql(Query([("a", "p", "b")]))
    assert run(sql) == [(1,)]
    sql = bgp_to_sql(Query([("a", "p", "zzz")]))
    assert run(sql) == []


def test_quoting_of_literals():
    q = Query([("?s", "p", "it's")])
    assert "it''s" in bgp_to_sql(q)


def test_distinct_dedupes():
    # both p-edges from a give the same binding for ?s once projected
    sql = bgp_to_sql(Query([("?s", "p", "?o1"), ("?s", "p", "?o2")]))
    rows = run(sql)
    assert len(rows) == len(set(rows))
