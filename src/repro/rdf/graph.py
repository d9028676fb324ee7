"""Distributed RDF graph (paper Definition 1) as Spark DataFrames.

A graph is vertex-disjoint partitioned into ``k`` fragments. Each fragment
stores its internal edges plus a replica of every crossing edge it touches;
the non-local endpoint of a crossing edge is an *extended* vertex of the
fragment, local endpoints are *internal* vertices.

Dataflow representation:

- ``triples``:      ``(s, p, o)`` — the global RDF graph, one row per edge.
- ``vertex_frag``:  ``(v, frag)`` — the vertex-disjoint partitioning.
- ``fragment_edges``: ``(frag, s, p, o, s_frag, o_frag)`` — the per-site
  view. An internal edge (``s_frag == o_frag``) appears once; a crossing
  edge appears twice, once per endpoint fragment (the Def-1 replica).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F


@dataclass
class DistributedGraph:
    """A partitioned RDF graph plus cached derived views."""

    spark: SparkSession
    triples: DataFrame  # (s, p, o)
    vertex_frag: DataFrame  # (v, frag)
    k: int  # number of fragments/sites
    _fragment_edges: DataFrame | None = field(default=None, repr=False)
    _triples_pdf: pd.DataFrame | None = field(default=None, repr=False)

    @property
    def fragment_edges(self) -> DataFrame:
        """The replicated per-fragment edge view (built lazily, cached)."""
        if self._fragment_edges is None:
            self._fragment_edges = build_fragment_edges(
                self.triples, self.vertex_frag
            ).cache()
            self._fragment_edges.count()  # materialize once
        return self._fragment_edges

    def triples_pdf(self) -> pd.DataFrame:
        """Pandas copy of the global triples, for the DuckDB oracle."""
        if self._triples_pdf is None:
            self._triples_pdf = self.triples.toPandas()
        return self._triples_pdf

    def unpersist(self) -> None:
        if self._fragment_edges is not None:
            self._fragment_edges.unpersist()
            self._fragment_edges = None


def vertices_of(triples: DataFrame) -> DataFrame:
    """Distinct vertex set of a triple DataFrame, column ``v``.

    Subjects and objects are vertices; predicates are edge labels only
    (matching the paper's graph model).
    """
    return (
        triples.select(F.col("s").alias("v"))
        .unionByName(triples.select(F.col("o").alias("v")))
        .distinct()
    )


def build_fragment_edges(triples: DataFrame, vertex_frag: DataFrame) -> DataFrame:
    """Join the partitioning onto the edges and replicate crossing edges.

    Output columns: ``frag, s, p, o, s_frag, o_frag``. For a crossing edge
    (``s_frag != o_frag``) one row is emitted for each endpoint fragment,
    which is exactly Def 1's ``E_i^c`` replica set.
    """
    sf = vertex_frag.withColumnRenamed("v", "s").withColumnRenamed("frag", "s_frag")
    of = vertex_frag.withColumnRenamed("v", "o").withColumnRenamed("frag", "o_frag")
    tagged = triples.join(sf, "s").join(of, "o")
    return tagged.withColumn(
        "frag",
        F.explode(F.array_distinct(F.array(F.col("s_frag"), F.col("o_frag")))),
    ).select("frag", "s", "p", "o", "s_frag", "o_frag")


def fragment_edges_pdf(
    triples_pdf: pd.DataFrame, vertex_frag_pdf: pd.DataFrame
) -> pd.DataFrame:
    """Pure-pandas twin of :func:`build_fragment_edges` (driver-side tests).

    Same columns and replication semantics, computed without Spark so the
    local matcher can be unit-tested in isolation.
    """
    home = dict(zip(vertex_frag_pdf["v"], vertex_frag_pdf["frag"]))
    rows = []
    for s, p, o in zip(triples_pdf["s"], triples_pdf["p"], triples_pdf["o"]):
        sf, of = int(home[s]), int(home[o])
        for frag in {sf, of}:
            rows.append((frag, s, p, o, sf, of))
    return pd.DataFrame(
        rows, columns=["frag", "s", "p", "o", "s_frag", "o_frag"]
    )


def build_graph(
    spark: SparkSession, triples: DataFrame, vertex_frag: DataFrame, k: int
) -> DistributedGraph:
    """Assemble a :class:`DistributedGraph`, validating the partitioning.

    Every vertex must be assigned to exactly one fragment in ``[0, k)``
    (vertex-disjointness of Def 1).
    """
    return DistributedGraph(spark, triples, vertex_frag, k)


def partition_stats(g: DistributedGraph) -> pd.DataFrame:
    """Per-fragment statistics: internal edges, crossing replicas, vertices.

    Used by tests and by the §VII cost model's balance factor.
    """
    fe = g.fragment_edges
    agg = fe.groupBy("frag").agg(
        F.count("*").alias("edges_total"),
        F.sum((F.col("s_frag") == F.col("o_frag")).cast("long")).alias("internal_edges"),
        F.sum((F.col("s_frag") != F.col("o_frag")).cast("long")).alias("crossing_edges"),
    )
    nv = g.vertex_frag.groupBy("frag").agg(F.count("*").alias("internal_vertices"))
    return (
        agg.join(nv, "frag", "outer")
        .na.fill(0)
        .orderBy("frag")
        .toPandas()
    )
