"""Partitioning cost model of Section VII (Table IV).

For a partitioning F with crossing-edge set ``E^c``::

    p_F(v)    = |N(v) ∩ E^c| / (2 |E^c|)
    E_F(v)    = |N(v) ∩ E^c| * p_F(v)
    E_F(V)    = Σ_v E_F(v)  =  Σ_v |N(v) ∩ E^c|² / (2 |E^c|)
    Cost(F)   = E_F(V) * max_i |E_i ∪ E_i^c|

A low cost wants crossing edges *scattered* across many boundary vertices
(small Σ deg²) and *balanced* fragments (small max fragment edge count).
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.rdf.graph import build_fragment_edges


@dataclass(frozen=True)
class PartitioningCost:
    """Cost_Partitioning and its two factors, for one partitioning."""

    n_crossing: int  # |E^c|
    scatter: float  # E_F(V)
    max_fragment_edges: int  # max_i |E_i ∪ E_i^c|

    @property
    def cost(self) -> float:
        return self.scatter * self.max_fragment_edges


def partitioning_cost(
    triples: DataFrame, vertex_frag: DataFrame
) -> PartitioningCost:
    """Evaluate the §VII cost model with DataFrame aggregations.

    Crossing-edge degrees are computed by unioning the subject and object
    endpoints of crossing edges and counting per vertex; the balance factor
    is the row count of the largest fragment's replicated edge view.
    """
    fe = build_fragment_edges(triples, vertex_frag)
    crossing = fe.filter(F.col("s_frag") != F.col("o_frag"))
    # each crossing edge is replicated to 2 fragments: count distinct edges.
    n_crossing = crossing.select("s", "p", "o").distinct().count()
    if n_crossing == 0:
        max_edges = (
            fe.groupBy("frag").count().agg(F.max("count")).collect()[0][0] or 0
        )
        return PartitioningCost(0, 0.0, int(max_edges))

    one_copy = crossing.filter(F.col("frag") == F.col("s_frag"))
    deg = (
        one_copy.select(F.col("s").alias("v"))
        .unionByName(one_copy.select(F.col("o").alias("v")))
        .groupBy("v")
        .count()
    )
    sum_sq = deg.agg(F.sum(F.col("count") * F.col("count"))).collect()[0][0]
    scatter = float(sum_sq) / (2.0 * n_crossing)
    max_edges = fe.groupBy("frag").count().agg(F.max("count")).collect()[0][0]
    return PartitioningCost(n_crossing, scatter, int(max_edges))
