"""Assembling variables' internal candidates (Algorithm 4, §VI).

Each site computes, per query variable ``v``, its *internal candidate* set
``C(Q, v)`` — internal vertices whose local edge signature is compatible
with every triple pattern incident to ``v`` (the filter-and-evaluate step of
the local store). Candidates are hashed into a fixed-length bit vector; the
coordinator ORs the per-site vectors and broadcasts the result. During
partial evaluation a site then refuses to bind ``v`` to an *extended*
vertex whose bit is absent: such a vertex is internal elsewhere, and if its
home site did not report it, it cannot appear in any complete match.

Because every vertex is internal to exactly one site, the OR of the
per-site candidate sets equals the *global* candidate set, which we compute
with one Catalyst pipeline (per-requirement scans + semi-joins) instead of
per-site loops; the shipment accounting still reflects the per-site bit
vectors the paper sends (k sites × |vars| vectors, up and down).
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.partial_eval import candidate_bit
from repro.core.query import Query, is_var
from repro.rdf.graph import DistributedGraph


@dataclass
class CandidateBits:
    """Per-variable candidate bit vectors plus shipment accounting."""

    bits: dict[str, int]  # variable term -> bitlen-wide bitmask
    bitlen: int
    ship_bytes: int
    counts: dict[str, int]  # variable term -> |C(Q, v)| (diagnostics)


def variable_requirements(query: Query, v: str) -> list[tuple[str, str, str]]:
    """(direction, predicate term, other-endpoint term) for each pattern
    incident to variable ``v``."""
    reqs: list[tuple[str, str, str]] = []
    for e in query.edges:
        if query.vertices[e.si] == v:
            reqs.append(("out", e.p, query.vertices[e.oi]))
        if query.vertices[e.oi] == v:
            reqs.append(("in", e.p, query.vertices[e.si]))
    return reqs


def candidate_vertices(triples: DataFrame, query: Query, v: str) -> DataFrame:
    """Global candidate set of variable ``v`` as a one-column (``v``) frame."""
    cand: DataFrame | None = None
    for direction, p, other in variable_requirements(query, v):
        df = triples
        if not is_var(p):
            df = df.filter(F.col("p") == F.lit(p))
        own, other_col = ("s", "o") if direction == "out" else ("o", "s")
        if not is_var(other):
            df = df.filter(F.col(other_col) == F.lit(other))
        keyed = df.select(F.col(own).alias("v")).distinct()
        cand = keyed if cand is None else cand.join(keyed, "v", "left_semi")
    assert cand is not None  # queries are connected: every var has an edge
    return cand


def assemble_candidate_bits(
    graph: DistributedGraph, query: Query, *, bitlen: int = 4096
) -> CandidateBits:
    """Run Algorithm 4 and return the OR-ed bit vectors per variable.

    All per-variable pipelines are unioned into a single Spark action so
    the stage pays one job's scheduling overhead regardless of |vars|.
    """

    def to_bit(col: pd.Series) -> pd.Series:
        return col.map(lambda x: candidate_bit(x, bitlen))

    bit_udf = F.pandas_udf(to_bit, "int")
    per_var = None
    for v in query.vertex_vars:
        cand = candidate_vertices(graph.triples, query, v)
        agg = (
            cand.withColumn("bit", bit_udf(F.col("v")))
            .agg(F.collect_set("bit").alias("bits"), F.count("*").alias("n"))
            .select(F.lit(v).alias("var"), "bits", "n")
        )
        per_var = agg if per_var is None else per_var.unionByName(agg)

    bits: dict[str, int] = {}
    counts: dict[str, int] = {}
    for row in per_var.collect() if per_var is not None else []:
        mask = 0
        for b in row["bits"]:
            mask |= 1 << int(b)
        bits[row["var"]] = mask
        counts[row["var"]] = int(row["n"])
    # every site ships one vector per variable to the coordinator and gets
    # the OR-ed vector back (Algorithm 4 lines 5-8 and 15-16)
    ship = 2 * graph.k * len(query.vertex_vars) * (bitlen // 8)
    return CandidateBits(bits, bitlen, ship, counts)
