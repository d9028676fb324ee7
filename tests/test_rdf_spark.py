"""Spark tests for the RDF substrate: Def-1 invariants of the fragment
view, the three partitioners, and the §VII cost model (exact Fig-8 values).
"""
import pandas as pd
import pytest

from repro.rdf.build import distribute
from repro.rdf.cost_model import partitioning_cost
from repro.rdf.datasets import lubm, to_spark
from repro.rdf.graph import (
    build_fragment_edges,
    fragment_edges_pdf,
    partition_stats,
    vertices_of,
)
from repro.rdf.partition import PARTITIONERS, uri_domain


@pytest.fixture(scope="module")
def lubm_pdf():
    return lubm(universities=2, seed=7)


@pytest.mark.parametrize("strategy", sorted(PARTITIONERS))
def test_partitioning_is_vertex_disjoint_and_total(spark, lubm_pdf, strategy):
    triples = to_spark(spark, lubm_pdf)
    vf = PARTITIONERS[strategy](triples, 3).toPandas()
    verts = set(lubm_pdf["s"]) | set(lubm_pdf["o"])
    assert set(vf["v"]) == verts  # total
    assert vf["v"].is_unique  # disjoint
    assert vf["frag"].between(0, 2).all()


@pytest.mark.parametrize("strategy", sorted(PARTITIONERS))
def test_partitioning_deterministic(spark, lubm_pdf, strategy):
    triples = to_spark(spark, lubm_pdf)
    a = PARTITIONERS[strategy](triples, 3).toPandas().sort_values("v")
    b = PARTITIONERS[strategy](triples, 3).toPandas().sort_values("v")
    pd.testing.assert_frame_equal(
        a.reset_index(drop=True), b.reset_index(drop=True)
    )


def test_semantic_hash_colocates_universities(spark, lubm_pdf):
    triples = to_spark(spark, lubm_pdf)
    vf = PARTITIONERS["semantic"](triples, 4).toPandas()
    vf = vf[vf["v"].str.startswith("lubm:U")]
    vf["uni"] = vf["v"].str.extract(r"^(lubm:U\d+)")
    assert (vf.groupby("uni")["frag"].nunique() == 1).all()


def test_metis_lite_cuts_fewer_edges_than_hash(spark, lubm_pdf):
    triples = to_spark(spark, lubm_pdf)

    def n_crossing(strategy):
        vf = PARTITIONERS[strategy](triples, 3)
        fe = build_fragment_edges(triples, vf)
        return (
            fe.filter("s_frag != o_frag").select("s", "p", "o").distinct().count()
        )

    assert n_crossing("metis") < n_crossing("hash")


def test_uri_domain_expression(spark):
    df = spark.createDataFrame(
        [("lubm:U3:D1:GS2",), ("yago:p7",), ("plainliteral",)], ["v"]
    )
    got = [r[0] for r in df.select(uri_domain("v")).collect()]
    assert got == ["lubm:U3", "yago:p7", "plainliteral"]


def test_fragment_edges_spark_equals_pandas(spark, lubm_pdf):
    g = distribute(spark, lubm_pdf, 3, strategy="hash")
    spark_fe = (
        g.fragment_edges.toPandas()
        .sort_values(["frag", "s", "p", "o"])
        .reset_index(drop=True)
    )
    pandas_fe = (
        fragment_edges_pdf(lubm_pdf, g.vertex_frag.toPandas())
        .sort_values(["frag", "s", "p", "o"])
        .reset_index(drop=True)
    )
    pd.testing.assert_frame_equal(
        spark_fe.astype(str), pandas_fe.astype(str)
    )
    g.unpersist()


def test_partition_stats_consistency(spark, lubm_pdf):
    g = distribute(spark, lubm_pdf, 3, strategy="hash")
    st = partition_stats(g)
    assert len(st) == 3
    assert (st["edges_total"] == st["internal_edges"] + st["crossing_edges"]).all()
    # every crossing edge counted twice across fragments
    n_cross = (
        g.fragment_edges.filter("s_frag != o_frag")
        .select("s", "p", "o")
        .distinct()
        .count()
    )
    assert st["crossing_edges"].sum() == 2 * n_cross
    assert st["internal_vertices"].sum() == vertices_of(g.triples).count()
    g.unpersist()


# ---------------------------------------------------------------------------
# §VII worked example (Fig 8): costs 27.5 and 23.4
# ---------------------------------------------------------------------------

def _graph_a(spark):
    """All 4 crossing edges share boundary vertex a0; max fragment 11."""
    rows = [(f"a{i}", "e", f"a{i+1}") for i in range(7)]  # F0 internal
    rows += [("a0", "c", f"b{i}") for i in range(1, 5)]  # crossing
    rows += [("b1", "e", "b2"), ("b2", "e", "b3")]  # F1 internal
    triples = spark.createDataFrame(rows, ["s", "p", "o"])
    assign = [(f"a{i}", 0) for i in range(8)] + [(f"b{i}", 1) for i in range(1, 5)]
    vf = spark.createDataFrame(assign, ["v", "frag"])
    return triples, vf


def _graph_b(spark):
    """5 crossing edges scattered over x (3) and y (2); max fragment 13."""
    rows = [(f"a{i}", "e", f"a{i+1}") for i in range(6)]  # 6 internal
    rows += [("x", "e", "a0"), ("y", "e", "a0")]  # 8 internal in F0
    rows += [("x", "c", f"c{i}") for i in range(1, 4)]  # 3 crossing
    rows += [("y", "c", f"c{i}") for i in range(4, 6)]  # 2 crossing
    rows += [("c1", "e", "c2"), ("c2", "e", "c3"), ("c4", "e", "c5")]
    triples = spark.createDataFrame(rows, ["s", "p", "o"])
    assign = (
        [(f"a{i}", 0) for i in range(7)]
        + [("x", 0), ("y", 0)]
        + [(f"c{i}", 1) for i in range(1, 6)]
    )
    vf = spark.createDataFrame(assign, ["v", "frag"])
    return triples, vf


def test_cost_model_fig8_partitioning_a(spark):
    triples, vf = _graph_a(spark)
    c = partitioning_cost(triples, vf)
    assert c.n_crossing == 4
    assert c.scatter == pytest.approx(2.5)
    assert c.max_fragment_edges == 11
    assert c.cost == pytest.approx(27.5)


def test_cost_model_fig8_partitioning_b(spark):
    triples, vf = _graph_b(spark)
    c = partitioning_cost(triples, vf)
    assert c.n_crossing == 5
    assert c.scatter == pytest.approx(1.8)
    assert c.max_fragment_edges == 13
    assert c.cost == pytest.approx(23.4)


def test_cost_model_prefers_scattered_partitioning(spark):
    ta, va = _graph_a(spark)
    tb, vb = _graph_b(spark)
    assert (
        partitioning_cost(tb, vb).cost < partitioning_cost(ta, va).cost
    )  # the paper picks (b)


def test_cost_model_no_crossing_edges(spark):
    triples = spark.createDataFrame([("a", "p", "b")], ["s", "p", "o"])
    vf = spark.createDataFrame([("a", 0), ("b", 0)], ["v", "frag"])
    c = partitioning_cost(triples, vf)
    assert c.cost == 0.0 and c.n_crossing == 0
