"""Catalyst BGP pipeline tests: whole-graph (S2RDF-lite) and per-fragment
scoped evaluation, checked against the DuckDB oracle."""
import pytest

from repro.core.bgp_spark import evaluate_bgp
from repro.core.query import Query
from repro.oracle import assert_equivalent
from repro.oracle_bgp import bgp_to_sql
from repro.rdf.build import distribute
from repro.rdf.datasets import lubm, to_spark
from repro.rdf.queries import LUBM_QUERIES
from tests.helpers import local_matches, oracle_rows


@pytest.fixture(scope="module")
def lubm_pdf():
    return lubm(universities=2, seed=7)


@pytest.fixture(scope="module")
def lubm_graph(spark, lubm_pdf):
    g = distribute(spark, lubm_pdf, 3, strategy="hash")
    yield g
    g.unpersist()


@pytest.mark.parametrize("name", sorted(LUBM_QUERIES))
def test_whole_graph_pipeline_matches_oracle(spark, lubm_pdf, name):
    """S2RDF-lite: Spark SQL joins over the full triple table."""
    query = LUBM_QUERIES[name]
    triples = to_spark(spark, lubm_pdf)
    got = evaluate_bgp(triples, query)
    assert_equivalent(got, bgp_to_sql(query), triples=lubm_pdf)


def test_scoped_pipeline_is_per_fragment(lubm_graph, lubm_pdf):
    """Fragment-scoped evaluation equals the per-fragment DuckDB oracle."""
    query = LUBM_QUERIES["LQ1"]
    got = {
        tuple(r)
        for r in evaluate_bgp(
            lubm_graph.fragment_edges, query, scope_col="frag"
        )
        .toPandas()
        .itertuples(index=False)
    }
    want = local_matches(lubm_pdf, lubm_graph.vertex_frag.toPandas(), query)
    assert got == want


def test_scoped_star_query_equals_global(lubm_graph, lubm_pdf):
    """§VIII-B: star matches never span fragments, so scoped == global."""
    for name in ("LQ2", "LQ4", "LQ5"):
        query = LUBM_QUERIES[name]
        assert query.is_star()
        got = {
            tuple(r)
            for r in evaluate_bgp(
                lubm_graph.fragment_edges, query, scope_col="frag"
            )
            .toPandas()
            .itertuples(index=False)
        }
        assert got == oracle_rows(lubm_pdf, query), name


def test_scoped_results_subset_of_global(lubm_graph, lubm_pdf):
    for name in ("LQ1", "LQ6", "LQ7"):
        query = LUBM_QUERIES[name]
        got = {
            tuple(r)
            for r in evaluate_bgp(
                lubm_graph.fragment_edges, query, scope_col="frag"
            )
            .toPandas()
            .itertuples(index=False)
        }
        assert got <= oracle_rows(lubm_pdf, query), name


def test_pipeline_repeated_var_within_pattern(spark):
    triples = to_spark(
        spark,
        __import__("pandas").DataFrame(
            [("a", "p", "a"), ("a", "p", "b")], columns=["s", "p", "o"]
        ),
    )
    q = Query([("?x", "p", "?x")])
    rows = evaluate_bgp(triples, q).collect()
    assert [r["x"] for r in rows] == ["a"]


def test_pipeline_predicate_variable(spark, lubm_pdf):
    q = Query([("?s", "?p", "lubm:U0:D0")])
    triples = to_spark(spark, lubm_pdf)
    assert_equivalent(evaluate_bgp(triples, q), bgp_to_sql(q), triples=lubm_pdf)
