"""Assembly of local partial matches (Algorithm 3 and the [18] baseline).

Crossing matches are produced by iteratively joining PM DataFrames.
Each round merges one more PM into every partial combination (Theorem 4
bounds combinations at |V^Q| members, so ≤ |V^Q|−1 rounds):

- **lec mode** (Algorithm 3): candidate pairs come from an equi-join on a
  shared ``cmap`` entry — the dataflow image of walking the LECSign-group
  join graph, since only joinable groups can share an entry with disjoint
  signs. Def 9's remaining conditions and binding compatibility are Spark
  SQL filters.
- **basic mode** (the [18] baseline): candidate pairs come from a cross
  join with the same conditions applied as a *post*-filter — the larger
  join space the paper's optimization removes.

A merged row keeps ``sign`` (bitwise OR), ``cmap`` (array union) and the
coalesced bindings; rows whose sign reaches all-ones are complete crossing
matches (Theorem 4: every query vertex internal somewhere ⇒ every query
edge matched).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql.types import StructType

from repro.core.partial_eval import pm_schema
from repro.core.query import Query, var_col

# no two cmap entries may map the same query edge to different data edges
# (Definition 9, condition 3)
_NO_CONFLICT = (
    "NOT exists(a.cmap, x -> exists(b.cmap, y -> "
    "substring_index(x, '##', 1) = substring_index(y, '##', 1) AND x != y))"
)


def _merge_pairs(pairs: DataFrame, query: Query, data_cols: list[str]) -> DataFrame:
    cond = F.expr("(a.sign & b.sign) = 0") & F.expr(_NO_CONFLICT)
    for c in data_cols:
        cond = cond & (
            F.col(f"a.{c}").isNull()
            | F.col(f"b.{c}").isNull()
            | (F.col(f"a.{c}") == F.col(f"b.{c}"))
        )
    merged_cols = [
        F.expr("a.sign | b.sign").alias("sign"),
        F.array_sort(F.array_union(F.col("a.cmap"), F.col("b.cmap"))).alias("cmap"),
    ] + [F.coalesce(F.col(f"a.{c}"), F.col(f"b.{c}")).alias(c) for c in data_cols]
    return pairs.filter(cond).select(*merged_cols).dropDuplicates()


def assemble(
    pm_df: DataFrame,
    query: Query,
    *,
    mode: str = "lec",
) -> DataFrame:
    """Join all PMs; return complete crossing matches (m_*/pv_* columns).

    ``pm_df`` must have the :func:`repro.core.partial_eval.pm_columns`
    layout. The result is deduplicated on the binding columns.
    """
    assert mode in ("lec", "basic"), mode
    spark = pm_df.sparkSession
    full = query.full_sign
    data_cols = [f"m_{i}" for i in range(query.n_vertices)] + [
        f"pv_{var_col(v)}" for v in query.pred_vars
    ]
    out_schema = pm_schema(query)[3:]  # sign/cmap dropped in the result

    base = pm_df.select("sign", "cmap", *data_cols).dropDuplicates().cache()
    n_base = base.count()
    # the iterative rounds shuffle many small frames; right-size the
    # shuffle width to the PM count (restored before returning)
    old_parts = spark.conf.get("spark.sql.shuffle.partitions")
    spark.conf.set(
        "spark.sql.shuffle.partitions",
        str(max(4, min(64, n_base // 5_000 + 4))),
    )
    try:
        return _assemble_rounds(
            spark, base, n_base, query, mode, data_cols, out_schema, full
        )
    finally:
        spark.conf.set("spark.sql.shuffle.partitions", old_parts)


def _assemble_rounds(
    spark, base, n_base, query, mode, data_cols, out_schema, full
) -> DataFrame:
    completes: list[DataFrame] = []
    frontier = base
    n_frontier = n_base
    for _ in range(max(1, query.n_vertices - 1)):
        if n_frontier == 0:
            break
        if mode == "lec":
            fa = frontier.withColumn("_e", F.explode("cmap")).alias("a")
            pb = base.withColumn("_e", F.explode("cmap")).alias("b")
            pairs = fa.join(pb, F.col("a._e") == F.col("b._e"))
        else:
            pairs = frontier.alias("a").join(
                base.alias("b"),
                F.expr("arrays_overlap(a.cmap, b.cmap)"),
            )
        # localCheckpoint truncates the logical plan: without it each round's
        # plan nests the previous rounds' joins and Catalyst planning time
        # (not execution) comes to dominate small queries.
        merged = _merge_pairs(pairs, query, data_cols).localCheckpoint()
        done = merged.filter(F.col("sign") == full).drop("sign", "cmap")
        completes.append(done)
        frontier = merged.filter(F.col("sign") != full)
        n_frontier = frontier.count()

    base.unpersist()
    if not completes:
        return spark.createDataFrame([], schema=StructType(list(out_schema)))
    out = completes[0]
    for df in completes[1:]:
        out = out.unionByName(df)
    return out.dropDuplicates()


def bindings(matches_df: DataFrame, query: Query) -> DataFrame:
    """Project m_*/pv_* match rows to DISTINCT variable-binding columns."""
    cols = [
        F.col(f"m_{query.vertex_index[v]}").alias(var_col(v))
        for v in query.vertex_vars
    ] + [F.col(f"pv_{var_col(v)}").alias(var_col(v)) for v in query.pred_vars]
    if not cols:
        return matches_df.select(F.lit(1).alias("matched")).distinct()
    return matches_df.select(*cols).distinct()
