"""End-to-end engine tests: every benchmark query on every dataset at test
scale, checked against the DuckDB oracle, for the full variant; ablation
variants cross-checked on representative complex queries; star queries
verified to take the zero-communication path."""
import pytest

from repro.core.engine import GStoreD
from repro.oracle import assert_equivalent
from repro.oracle_bgp import bgp_to_sql
from repro.rdf.build import distribute
from repro.rdf.datasets import btc, lubm, yago2
from repro.rdf.queries import ALL_QUERIES

DATA = {
    "lubm": lambda: lubm(universities=2, seed=7),
    "yago2": lambda: yago2(persons=80, seed=11),
    "btc": lambda: btc(persons_per_pub=40, seed=13),
}

CASES = [
    (ds, qname) for ds, queries in ALL_QUERIES.items() for qname in queries
]


@pytest.fixture(scope="module")
def graphs(spark):
    out = {}
    for ds, gen in DATA.items():
        pdf = gen()
        out[ds] = (pdf, distribute(spark, pdf, 3, strategy="hash"))
    yield out
    for _, g in out.values():
        g.unpersist()


@pytest.mark.parametrize("ds,qname", CASES, ids=[f"{d}-{q}" for d, q in CASES])
def test_full_engine_matches_oracle(graphs, ds, qname):
    pdf, g = graphs[ds]
    query = ALL_QUERIES[ds][qname]
    result, metrics = GStoreD(g, variant="full").run(query)
    assert_equivalent(result, bgp_to_sql(query), triples=pdf)
    assert metrics.total_ms >= 0
    assert metrics.n_matches == result.count()


@pytest.mark.parametrize(
    "ds,qname",
    [("lubm", "LQ2"), ("lubm", "LQ4"), ("lubm", "LQ5"),
     ("btc", "BQ1"), ("btc", "BQ2"), ("btc", "BQ3")],
)
def test_star_queries_take_local_path(graphs, ds, qname):
    """Tables I/III: star rows have zero candidate/LEC/assembly columns."""
    pdf, g = graphs[ds]
    query = ALL_QUERIES[ds][qname]
    result, metrics = GStoreD(g, variant="full").run(query)
    assert metrics.star
    assert metrics.cand_time_ms == 0 and metrics.cand_ship_kb == 0
    assert metrics.lec_time_ms == 0 and metrics.lec_ship_kb == 0
    assert metrics.assembly_time_ms == 0
    assert metrics.n_pms == 0 and metrics.n_crossing == 0
    assert_equivalent(result, bgp_to_sql(query), triples=pdf)


@pytest.mark.parametrize("variant", ["basic", "la", "lo"])
@pytest.mark.parametrize(
    "ds,qname", [("lubm", "LQ1"), ("yago2", "YQ1"), ("btc", "BQ4")]
)
def test_ablation_variants_agree(graphs, variant, ds, qname):
    pdf, g = graphs[ds]
    query = ALL_QUERIES[ds][qname]
    full, m_full = GStoreD(g, variant="full").run(query)
    other, m_other = GStoreD(g, variant=variant).run(query)
    a = set(map(tuple, full.toPandas().itertuples(index=False)))
    b = set(map(tuple, other.toPandas().itertuples(index=False)))
    assert a == b
    assert m_full.n_matches == m_other.n_matches
    # pruning stages only ever reduce the PM count
    assert m_full.n_pms <= m_other.n_pms


def test_zero_result_selective_query_is_cheap(graphs):
    """LQ3: empty candidates → zero PMs, zero crossing matches."""
    pdf, g = graphs["lubm"]
    query = ALL_QUERIES["lubm"]["LQ3"]
    _, metrics = GStoreD(g, variant="full").run(query)
    assert metrics.n_pms == 0
    assert metrics.n_matches == 0
    assert metrics.n_crossing == 0


def test_metrics_row_layout(graphs):
    pdf, g = graphs["lubm"]
    _, metrics = GStoreD(g, variant="full").run(ALL_QUERIES["lubm"]["LQ1"])
    row = metrics.row()
    assert list(row) == [
        "query", "sel", "cand_ms", "cand_kb", "pm_ms", "lec_ms",
        "lec_kb", "asm_ms", "total_ms", "pms", "matches", "crossing",
    ]
    assert row["query"] == "LQ1"
