"""Partitioning strategies evaluated in §VIII-D / Table IV.

All three return a vertex-disjoint ``(v, frag)`` DataFrame:

- :func:`hash_partition` — the paper's default (``H(v) MOD N``): uniform
  vertices and crossing edges.
- :func:`semantic_hash_partition` — Lee & Liu-style URI-hierarchy hashing:
  vertices sharing a URI *domain* prefix land together. Our URIs are
  ``ns:domain:rest``; the domain is the first two ``:``-segments, so
  LUBM-lite co-locates whole universities while YAGO2-lite (one flat
  namespace, unique second segment) degenerates to plain hash — exactly the
  behaviour the paper reports for the two datasets.
- :func:`metis_lite_partition` — a deterministic METIS stand-in (documented
  substitution in DESIGN.md): BFS-ordered linear greedy streaming with a
  relaxed balance cap. It trades fewer crossing edges for worse balance,
  which is the property Table IV needs from METIS.
"""
from __future__ import annotations

from collections import defaultdict

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.rdf.graph import vertices_of


def hash_partition(triples: DataFrame, k: int, *, salt: int = 0) -> DataFrame:
    """``frag = xxhash64(v, salt) mod k`` over the vertex set."""
    return vertices_of(triples).withColumn(
        "frag", F.pmod(F.xxhash64(F.col("v"), F.lit(salt)), F.lit(k)).cast("int")
    )


def uri_domain(col):
    """URI domain column expression: first two ``:``-segments, else the value."""
    if isinstance(col, str):
        col = F.col(col)
    d = F.regexp_extract(col, r"^([^:]+:[^:]+)", 1)
    return F.when(d == "", col).otherwise(d)


def semantic_hash_partition(triples: DataFrame, k: int, *, salt: int = 0) -> DataFrame:
    """Hash the URI domain instead of the full URI."""
    return vertices_of(triples).withColumn(
        "frag",
        F.pmod(F.xxhash64(uri_domain(F.col("v")), F.lit(salt)), F.lit(k)).cast("int"),
    )


def metis_lite_partition(
    triples: DataFrame, k: int, *, capacity_slack: float = 1.02
) -> DataFrame:
    """Deterministic greedy min-edge-cut streaming partitioner.

    Vertices are streamed in BFS order (lexicographically smallest unvisited
    seed per component) and each is assigned to the fragment maximising
    ``|assigned neighbours| * (1 - size/capacity)`` with
    ``capacity = slack * |V| / k`` — the classic LDG rule. Like METIS it
    balances *vertex* counts (within ``slack``), so on hub-skewed graphs
    (YAGO2-lite) the min-cut objective drags hub neighbourhoods together and
    fragments become *edge*-imbalanced — exactly the "fewer crossing edges
    but much more imbalanced" behaviour §VIII-D reports for METIS.

    The graph is collected to the driver: partitioning in the paper is an
    offline preprocessing step and our graphs are ≤ ~100 K edges.
    """
    edges = triples.select("s", "o").toPandas()
    adj: dict[str, set[str]] = defaultdict(set)
    verts: set[str] = set()
    for s, o in zip(edges["s"], edges["o"]):
        verts.add(s)
        verts.add(o)
        if s != o:
            adj[s].add(o)
            adj[o].add(s)

    capacity = max(1.0, capacity_slack * len(verts) / k)
    assign: dict[str, int] = {}
    sizes = [0] * k

    # BFS order: deterministic seeds and neighbour iteration.
    order: list[str] = []
    seen: set[str] = set()
    for seed in sorted(verts):
        if seed in seen:
            continue
        queue = [seed]
        seen.add(seed)
        while queue:
            v = queue.pop(0)
            order.append(v)
            for w in sorted(adj[v]):
                if w not in seen:
                    seen.add(w)
                    queue.append(w)

    for v in order:
        neigh_counts = [0] * k
        for w in adj[v]:
            f = assign.get(w)
            if f is not None:
                neigh_counts[f] += 1
        best, best_score = None, -1.0
        for f in range(k):
            if sizes[f] >= capacity:
                continue
            score = neigh_counts[f] * (1.0 - sizes[f] / capacity)
            if score > best_score:
                best, best_score = f, score
        if best is None or best_score <= 0.0:
            # no assigned neighbour (or all attractive fragments full):
            # fall back to the least-loaded fragment.
            best = min(range(k), key=lambda f: (sizes[f], f))
        assign[v] = best
        sizes[best] += 1

    pdf = pd.DataFrame(
        {"v": list(assign.keys()), "frag": list(assign.values())}
    ).astype({"frag": "int32"})
    return triples.sparkSession.createDataFrame(pdf)


PARTITIONERS = {
    "hash": hash_partition,
    "semantic": semantic_hash_partition,
    "metis": metis_lite_partition,
}
