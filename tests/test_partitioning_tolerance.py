"""Partitioning-tolerance: the engine's answers are identical under hash,
semantic-hash and METIS-lite partitionings (the paper's core design goal),
and under different fragment counts."""
import pytest

from repro.core.engine import GStoreD
from repro.oracle import assert_equivalent
from repro.oracle_bgp import bgp_to_sql
from repro.rdf.build import distribute
from repro.rdf.datasets import lubm
from repro.rdf.queries import LUBM_QUERIES


@pytest.fixture(scope="module")
def lubm_pdf():
    return lubm(universities=2, seed=7)


@pytest.mark.parametrize("strategy", ["hash", "semantic", "metis"])
@pytest.mark.parametrize("qname", ["LQ1", "LQ6", "LQ7"])
def test_engine_tolerates_partitioning(spark, lubm_pdf, strategy, qname):
    g = distribute(spark, lubm_pdf, 3, strategy=strategy)
    query = LUBM_QUERIES[qname]
    result, metrics = GStoreD(g, variant="full").run(query)
    assert_equivalent(result, bgp_to_sql(query), triples=lubm_pdf)
    g.unpersist()


@pytest.mark.parametrize("k", [1, 2, 5])
def test_engine_tolerates_fragment_count(spark, lubm_pdf, k):
    g = distribute(spark, lubm_pdf, k, strategy="hash")
    query = LUBM_QUERIES["LQ1"]
    result, metrics = GStoreD(g, variant="full").run(query)
    assert_equivalent(result, bgp_to_sql(query), triples=lubm_pdf)
    if k == 1:
        # one site: everything is local, nothing crosses
        assert metrics.n_pms == 0 and metrics.n_crossing == 0
    g.unpersist()


def test_semantic_partitioning_moves_work_to_local(spark, lubm_pdf):
    """Semantic hash keeps universities together, so LQ1's triangle (which
    stays inside one university except for degree edges) produces far fewer
    PMs than under plain hash — the §VIII-D mechanism."""
    query = LUBM_QUERIES["LQ1"]
    g_hash = distribute(spark, lubm_pdf, 3, strategy="hash")
    g_sem = distribute(spark, lubm_pdf, 3, strategy="semantic")
    _, m_hash = GStoreD(g_hash, variant="full").run(query)
    _, m_sem = GStoreD(g_sem, variant="full").run(query)
    assert m_sem.n_pms < m_hash.n_pms
    assert m_sem.n_matches == m_hash.n_matches
    g_hash.unpersist()
    g_sem.unpersist()
