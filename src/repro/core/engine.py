"""gStore^D engine: partial evaluation + assembly with per-stage metrics.

Variants mirror §VIII-C's ablation:

- ``basic`` — no optimization: PM computation, then cross-join assembly.
- ``la``    — + LEC feature-based assembly (Algorithm 3 join space).
- ``lo``    — + LEC feature-based pruning (Algorithm 2) before assembly.
- ``full``  — + assembling variables' internal candidates (Algorithm 4).

Star queries short-circuit to per-fragment Catalyst joins (§VIII-B): their
matches never cross fragments, so all optimization/communication columns
are zero, exactly as in Tables I–III.

Metrics reproduce the column layout of Tables I–III: candidate time/
shipment, PM-computation time, LEC-optimization time/shipment, assembly
time, total, and the three cardinalities.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.assembly import assemble, bindings
from repro.core.bgp_spark import evaluate_bgp
from repro.core.candidates import assemble_candidate_bits
from repro.core.lec import compute_lec_features
from repro.core.partial_eval import compute_pms
from repro.core.pruning import prune_features, surviving_feature_keys
from repro.core.query import Query
from repro.rdf.graph import DistributedGraph

VARIANTS = ("basic", "la", "lo", "full")


@dataclass
class StageMetrics:
    """One row of Tables I–III."""

    query: str
    selective: bool
    star: bool
    cand_time_ms: int = 0
    cand_ship_kb: float = 0.0
    pm_time_ms: int = 0
    lec_time_ms: int = 0
    lec_ship_kb: float = 0.0
    assembly_time_ms: int = 0
    total_ms: int = 0
    n_pms: int = 0
    n_matches: int = 0
    n_crossing: int = 0
    n_features: int = 0
    n_features_kept: int = 0

    def row(self) -> dict:
        """Table I–III row, paper column order."""
        return {
            "query": self.query,
            "sel": "Y" if self.selective else "",
            "cand_ms": self.cand_time_ms,
            "cand_kb": round(self.cand_ship_kb, 1),
            "pm_ms": self.pm_time_ms,
            "lec_ms": self.lec_time_ms,
            "lec_kb": round(self.lec_ship_kb, 1),
            "asm_ms": self.assembly_time_ms,
            "total_ms": self.total_ms,
            "pms": self.n_pms,
            "matches": self.n_matches,
            "crossing": self.n_crossing,
        }


class GStoreD:
    """Partial-evaluation-and-assembly engine over a distributed RDF graph."""

    def __init__(
        self,
        graph: DistributedGraph,
        *,
        variant: str = "full",
        bitlen: int = 4096,
        prune_max_states: int = 200_000,
    ):
        assert variant in VARIANTS, variant
        self.graph = graph
        self.variant = variant
        self.bitlen = bitlen
        self.prune_max_states = prune_max_states

    def run(self, query: Query) -> tuple[DataFrame, StageMetrics]:
        """Evaluate ``query``; returns (DISTINCT bindings, stage metrics).

        Shuffle parallelism is scaled to the fragment-view size for the
        duration of the query (the iterative assembly joins shuffle many
        small frames; a fixed wide setting would dominate the runtime) and
        restored afterwards.
        """
        spark = self.graph.spark
        old_parts = spark.conf.get("spark.sql.shuffle.partitions")
        n_edges = self.graph.fragment_edges.count()
        spark.conf.set(
            "spark.sql.shuffle.partitions",
            str(max(4, min(64, n_edges // 20_000 + 4))),
        )
        try:
            return self._run(query)
        finally:
            spark.conf.set("spark.sql.shuffle.partitions", old_parts)

    def _run(self, query: Query) -> tuple[DataFrame, StageMetrics]:
        m = StageMetrics(query.name, query.selective, query.is_star())
        t_start = time.perf_counter()
        fe = self.graph.fragment_edges

        if m.star:  # §VIII-B: stars never cross fragments
            t0 = time.perf_counter()
            result = evaluate_bgp(fe, query, scope_col="frag").cache()
            m.n_matches = result.count()
            m.pm_time_ms = _ms(t0)
            m.total_ms = _ms(t_start)
            return result, m

        ext_bits = None
        if self.variant == "full":
            t0 = time.perf_counter()
            cb = assemble_candidate_bits(self.graph, query, bitlen=self.bitlen)
            ext_bits = cb.bits
            m.cand_time_ms = _ms(t0)
            m.cand_ship_kb = cb.ship_bytes / 1024.0

        # --- partial evaluation (PMs + single-fragment complete matches) --
        t0 = time.perf_counter()
        pm_df = compute_pms(
            fe, query, ext_bits=ext_bits, bitlen=self.bitlen
        ).cache()
        m.n_pms = pm_df.count()
        local = evaluate_bgp(fe, query, scope_col="frag").cache()
        local.count()
        m.pm_time_ms = _ms(t0)

        # --- LEC feature-based optimization (Algorithm 1 + 2) -------------
        if self.variant in ("lo", "full") and m.n_pms:
            t0 = time.perf_counter()
            features = compute_lec_features(pm_df)
            m.n_features = len(features)
            m.lec_ship_kb = sum(f.ser_bytes() for f in features) / 1024.0
            res = prune_features(
                features, query.full_sign, max_states=self.prune_max_states
            )
            m.n_features_kept = len(res.surviving)
            if len(res.surviving) < len(features):
                keys = surviving_feature_keys(features, res)
                keep = self.graph.spark.createDataFrame(
                    [(f, s, list(c)) for f, s, c in keys],
                    schema="frag int, sign long, cmap array<string>",
                )
                pruned = pm_df.join(
                    F.broadcast(keep), on=["frag", "sign", "cmap"], how="left_semi"
                ).localCheckpoint()
                pm_df.unpersist()
                pm_df = pruned
            m.lec_time_ms = _ms(t0)

        # --- assembly ------------------------------------------------------
        t0 = time.perf_counter()
        mode = "basic" if self.variant == "basic" else "lec"
        crossing = (
            assemble(pm_df, query, mode=mode) if m.n_pms else None
        )
        cross_b = (
            bindings(crossing, query).cache()
            if crossing is not None
            else None
        )
        m.n_crossing = cross_b.count() if cross_b is not None else 0
        result = (
            local.unionByName(cross_b).distinct().cache()
            if cross_b is not None
            else local
        )
        m.n_matches = result.count()
        m.assembly_time_ms = _ms(t0)
        m.total_ms = _ms(t_start)
        # result is materialized; drop the intermediates so long sessions do
        # not accumulate cached plans (CacheManager lookups are linear)
        pm_df.unpersist()
        if cross_b is not None:
            local.unpersist()
            cross_b.unpersist()
        return result, m


def _ms(t0: float) -> int:
    return int(round((time.perf_counter() - t0) * 1000))
