"""BGP evaluation as a Catalyst join/filter pipeline over triple DataFrames.

Three uses:

1. **Star queries** (§VIII-B): star matches never span fragments because
   crossing edges are replicated, so gStore^D evaluates them as per-fragment
   joins (``scope_col="frag"``) with zero communication.
2. **Single-fragment complete matches** of non-star queries: matches whose
   edges all lie in one fragment's replicated view are found locally; the
   assembly stage only contributes matches that cross fragments.
3. **S2RDF-lite baseline**: evaluated over the whole triple table
   (``scope_col=None``), this is exactly the vertical-partitioning
   Spark SQL join strategy of S2RDF, used as the cloud-baseline comparator.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.query import Query, TriplePattern, is_var, var_col


def _pattern_df(
    edges: DataFrame, tp: TriplePattern, scope_col: str | None
) -> tuple[DataFrame, set[str]]:
    """One scan of the triple table for a single pattern.

    Returns the scan projected to its variable columns (plus the scope
    column), and the set of variable column names it binds.
    """
    df = edges
    bound: dict[str, str] = {}  # var column -> physical field
    for field, term in (("s", tp.s), ("p", tp.p), ("o", tp.o)):
        if is_var(term):
            c = var_col(term)
            if c in bound:  # repeated variable within one pattern (?x p ?x)
                df = df.filter(F.col(field) == F.col(bound[c]))
            else:
                bound[c] = field
        else:
            df = df.filter(F.col(field) == F.lit(term))
    cols = [F.col(f).alias(c) for c, f in bound.items()]
    if scope_col is not None:
        cols.append(F.col(scope_col))
    if not cols:  # fully ground pattern: boolean presence marker
        return df.select(F.lit(1).alias("matched")).limit(1), set()
    return df.select(*cols), set(bound)


def evaluate_bgp(
    edges: DataFrame, query: Query, *, scope_col: str | None = None
) -> DataFrame:
    """Evaluate ``query`` with chained equi-joins on shared variables.

    ``edges`` must expose ``s, p, o`` (and ``scope_col`` when given; the
    scope column is added to every join key, confining each match to a
    single scope value — i.e. one fragment). Returns DISTINCT bindings with
    one column per variable.
    """
    scans = [_pattern_df(edges, tp, scope_col) for tp in query.patterns]

    remaining = list(range(len(scans)))
    # greedy join order: always pick a pattern sharing a variable with the
    # accumulated result to avoid needless cross joins.
    first = remaining.pop(0)
    acc, acc_vars = scans[first]
    while remaining:
        pick = next(
            (i for i in remaining if scans[i][1] & acc_vars), remaining[0]
        )
        remaining.remove(pick)
        df, cols = scans[pick]
        shared = sorted(acc_vars & cols)
        if scope_col is not None and "matched" not in df.columns and scope_col in acc.columns:
            shared.append(scope_col)
        if shared:
            acc = acc.join(df, on=shared, how="inner")
        else:
            acc = acc.crossJoin(df)
        acc_vars |= cols

    out_cols = [var_col(v) for v in query.variables]
    if not out_cols:
        return acc.select(F.lit(1).alias("matched")).distinct()
    return acc.select(*out_cols).distinct()
