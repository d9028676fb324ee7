"""Algorithm 4 tests: candidate sets, bit vectors, filter soundness."""
import duckdb
import pytest

from repro.core.candidates import (
    assemble_candidate_bits,
    candidate_vertices,
    variable_requirements,
)
from repro.core.partial_eval import candidate_bit
from repro.core.query import Query
from repro.rdf.build import distribute
from repro.rdf.datasets import lubm
from repro.rdf.queries import LUBM_QUERIES
from tests.helpers import oracle_rows


@pytest.fixture(scope="module")
def lubm_pdf():
    return lubm(universities=2, seed=7)


@pytest.fixture(scope="module")
def lubm_graph(spark, lubm_pdf):
    g = distribute(spark, lubm_pdf, 3, strategy="hash")
    yield g
    g.unpersist()


def test_variable_requirements():
    q = Query([("?x", "p", "?y"), ("?y", "q", "c")])
    assert variable_requirements(q, "?x") == [("out", "p", "?y")]
    assert variable_requirements(q, "?y") == [
        ("in", "p", "?x"),
        ("out", "q", "c"),
    ]


def test_candidate_vertices_match_duckdb(lubm_graph, lubm_pdf):
    q = LUBM_QUERIES["LQ1"]
    got = {
        r["v"] for r in candidate_vertices(lubm_graph.triples, q, "?x").collect()
    }
    con = duckdb.connect()
    con.register("t", lubm_pdf)
    want = {
        r[0]
        for r in con.execute(
            "SELECT DISTINCT a.s FROM t a JOIN t b ON a.s = b.s "
            "WHERE a.p = 'ub:memberOf' AND b.p = 'ub:undergraduateDegreeFrom'"
        ).fetchall()
    }
    con.close()
    assert got == want


def test_candidate_constant_endpoint_restricts(lubm_graph):
    q = LUBM_QUERIES["LQ3"]
    # staff working for a department never have an undergraduate degree:
    # the ?x candidate intersection is empty (drives the paper's LQ3 row)
    assert candidate_vertices(lubm_graph.triples, q, "?x").count() == 0


def test_bits_cover_all_true_candidates(lubm_graph, lubm_pdf):
    """Soundness: every binding of a variable in any oracle match has its
    bit set (the filter may keep false positives, never false negatives)."""
    for name in ("LQ1", "LQ6", "LQ7"):
        q = LUBM_QUERIES[name]
        cb = assemble_candidate_bits(lubm_graph, q, bitlen=512)
        rows = oracle_rows(lubm_pdf, q)
        for row in rows:
            for var, val in zip(q.vertex_vars, row):
                bit = candidate_bit(val, 512)
                assert (cb.bits[var] >> bit) & 1, (name, var, val)


def test_bits_empty_for_empty_candidates(lubm_graph):
    cb = assemble_candidate_bits(lubm_graph, LUBM_QUERIES["LQ3"])
    assert cb.bits["?x"] == 0
    assert cb.counts["?x"] == 0


def test_ship_bytes_formula(lubm_graph):
    q = LUBM_QUERIES["LQ1"]
    cb = assemble_candidate_bits(lubm_graph, q, bitlen=4096)
    # k sites × |vars| vectors × bitlen/8 bytes, up and down
    assert cb.ship_bytes == 2 * 3 * 3 * (4096 // 8)


def test_candidate_bit_stable():
    assert candidate_bit("lubm:U0", 4096) == candidate_bit("lubm:U0", 4096)
    assert 0 <= candidate_bit("anything", 64) < 64
