"""Spark-layer tests: fragment view, distributed PM computation, LEC
features, assembly joins and the engine, on the paper's running example."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.assembly import assemble, bindings
from repro.core.engine import GStoreD, VARIANTS
from repro.core.lec import LECFeature, compute_lec_features
from repro.core.partial_eval import compute_pms
from repro.oracle import assert_equivalent
from repro.oracle_bgp import bgp_to_sql
from repro.rdf.build import distribute_mapped
from repro.rdf.datasets import paper_example
from tests.helpers import oracle_rows


@pytest.fixture(scope="module")
def example_graph(spark):
    triples, vfrag, query = paper_example()
    g = distribute_mapped(spark, triples, vfrag, 3)
    yield g, query, triples
    g.unpersist()


def test_fragment_edges_replication(example_graph):
    g, _, triples = example_graph
    fe = g.fragment_edges.toPandas()
    crossing = fe[fe.s_frag != fe.o_frag]
    internal = fe[fe.s_frag == fe.o_frag]
    # each crossing edge appears twice, internal edges once
    assert (crossing.groupby(["s", "p", "o"]).size() == 2).all()
    assert (internal.groupby(["s", "p", "o"]).size() == 1).all()
    # total distinct edges == input triples
    assert len(fe.drop_duplicates(["s", "p", "o"])) == len(triples)


def test_fragment_edges_crossing_set(example_graph):
    g, _, _ = example_graph
    fe = g.fragment_edges.toPandas()
    crossing = {
        (r.s, r.o) for r in fe[fe.s_frag != fe.o_frag].itertuples()
    }
    # Example 1 (0-indexed fragments): the four crossing edges of Fig 1
    assert crossing == {
        ("001", "006"),
        ("006", "005"),
        ("001", "012"),
        ("014", "013"),
    }


def test_distributed_pm_computation_matches_fig3(example_graph):
    g, query, _ = example_graph
    pm_df = compute_pms(g.fragment_edges, query)
    pms = pm_df.toPandas()
    assert len(pms) == 8
    sers = {
        tuple(None if pd.isna(x) else x for x in row)
        for row in pms[[f"m_{i}" for i in range(5)]].itertuples(index=False)
    }
    assert ("006", None, "001", None, "003") in sers  # PM_1^1
    assert ("014", "013", None, "017", None) in sers  # PM_3^2


def test_compute_lec_features_spark(example_graph):
    g, query, _ = example_graph
    pm_df = compute_pms(g.fragment_edges, query)
    feats = compute_lec_features(pm_df)
    assert len(feats) == 7  # Example 6
    assert all(isinstance(f, LECFeature) for f in feats)


@pytest.mark.parametrize("mode", ["lec", "basic"])
def test_assembly_modes_agree_with_oracle(example_graph, mode):
    g, query, triples = example_graph
    pm_df = compute_pms(g.fragment_edges, query).cache()
    matches = assemble(pm_df, query, mode=mode)
    got = {
        tuple(r)
        for r in bindings(matches, query).toPandas().itertuples(index=False)
    }
    # all four oracle matches cross fragments in this partitioning
    assert got == oracle_rows(triples, query)


@pytest.mark.parametrize("variant", VARIANTS)
def test_engine_variants_match_oracle(example_graph, variant):
    g, query, triples = example_graph
    engine = GStoreD(g, variant=variant)
    result, metrics = engine.run(query)
    assert_equivalent(result, bgp_to_sql(query), triples=triples)
    assert metrics.n_matches == 4
    assert metrics.n_crossing == 4
    # Algorithm 4 stops PM_3^2 from ever forming in the full variant
    # (its ?p2 binding 014 is in no site's internal candidates)
    assert metrics.n_pms == (7 if variant == "full" else 8)
    assert not metrics.star


def test_engine_lo_reports_feature_pruning(example_graph):
    g, query, _ = example_graph
    _, metrics = GStoreD(g, variant="lo").run(query)
    assert metrics.n_features == 7  # Example 6
    assert metrics.n_features_kept == 6  # LF(PM_3^2) pruned (Algorithm 2)
    assert metrics.lec_ship_kb > 0


def test_engine_full_reports_candidate_shipment(example_graph):
    g, query, _ = example_graph
    _, metrics = GStoreD(g, variant="full").run(query)
    # with Algorithm 4, PM_3^2 never forms, so only 6 features remain
    assert metrics.n_features == 6
    assert metrics.n_features_kept == 6
    assert metrics.cand_ship_kb > 0


def test_engine_basic_has_no_optimization_columns(example_graph):
    g, query, _ = example_graph
    _, metrics = GStoreD(g, variant="basic").run(query)
    assert metrics.cand_time_ms == 0
    assert metrics.cand_ship_kb == 0
    assert metrics.lec_time_ms == 0
    assert metrics.lec_ship_kb == 0
