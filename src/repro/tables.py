"""Harness for reproducing the evaluation tables (Tables I–IV).

One call per table row: run a query through the full gStore^D engine, record
the stage metrics in the paper's column layout, and render/persist the
table so EXPERIMENTS.md can diff paper vs measured numbers.
"""
from __future__ import annotations

import json
import time
from dataclasses import asdict
from pathlib import Path

from pyspark.sql import SparkSession

from repro.core.engine import GStoreD, StageMetrics
from repro.core.query import Query
from repro.rdf.build import distribute
from repro.rdf.cost_model import partitioning_cost
from repro.rdf.datasets import btc, lubm, to_spark, yago2
from repro.rdf.partition import PARTITIONERS
from repro.rdf.queries import ALL_QUERIES

RESULTS_DIR = Path(__file__).resolve().parents[2] / "results"

# benchmark-scale generator settings (paper datasets are 15-176 GB; see
# DESIGN.md §3 for the substitution argument): ~32 K / 17 K / 8 K triples
BENCH_SCALE = {
    "lubm": dict(universities=100, seed=7),
    "yago2": dict(persons=4000, seed=11),
    "btc": dict(persons_per_pub=400, seed=13),
}
BENCH_K = 8  # fragments/sites (paper: 12 machines)

GENERATORS = {"lubm": lubm, "yago2": yago2, "btc": btc}


def bench_graph(spark: SparkSession, dataset: str, *, strategy: str = "hash"):
    """Benchmark-scale distributed graph for one dataset."""
    pdf = GENERATORS[dataset](**BENCH_SCALE[dataset])
    return pdf, distribute(spark, pdf, BENCH_K, strategy=strategy)


def run_stage_table(
    spark: SparkSession,
    dataset: str,
    *,
    variant: str = "full",
    strategy: str = "hash",
    queries: dict[str, Query] | None = None,
) -> list[StageMetrics]:
    """Reproduce one of Tables I–III: run every benchmark query of a
    dataset through the engine and collect per-stage metrics."""
    _, graph = bench_graph(spark, dataset, strategy=strategy)
    engine = GStoreD(graph, variant=variant)
    out = []
    for name, query in (queries or ALL_QUERIES[dataset]).items():
        _, metrics = engine.run(query)
        out.append(metrics)
    graph.unpersist()
    return out


def run_cost_table(spark: SparkSession) -> dict[str, dict[str, dict]]:
    """Reproduce Table IV: Cost_Partitioning for hash / semantic / METIS on
    YAGO2-lite and LUBM-lite."""
    out: dict[str, dict[str, dict]] = {}
    for dataset in ("yago2", "lubm"):
        pdf = GENERATORS[dataset](**BENCH_SCALE[dataset])
        triples = to_spark(spark, pdf).cache()
        out[dataset] = {}
        for strategy, fn in PARTITIONERS.items():
            vf = fn(triples, BENCH_K)
            c = partitioning_cost(triples, vf)
            out[dataset][strategy] = {
                "cost": c.cost,
                "n_crossing": c.n_crossing,
                "scatter": c.scatter,
                "max_fragment_edges": c.max_fragment_edges,
            }
        triples.unpersist()
    return out


# ---------------------------------------------------------------------------
# rendering / persistence
# ---------------------------------------------------------------------------

_COLS = [
    ("query", 6), ("sel", 3), ("cand_ms", 8), ("cand_kb", 8), ("pm_ms", 7),
    ("lec_ms", 7), ("lec_kb", 7), ("asm_ms", 7), ("total_ms", 8),
    ("pms", 8), ("matches", 8), ("crossing", 8),
]


def format_stage_table(metrics: list[StageMetrics], title: str) -> str:
    lines = [title, "-" * len(title)]
    lines.append(" ".join(name.rjust(w) for name, w in _COLS))
    for m in metrics:
        row = m.row()
        lines.append(" ".join(str(row[name]).rjust(w) for name, w in _COLS))
    return "\n".join(lines)


def save_metrics(metrics: list[StageMetrics], path: Path | str) -> None:
    path = Path(path)
    path.parent.mkdir(parents=True, exist_ok=True)
    payload = {"ts": time.strftime("%Y-%m-%d %H:%M:%S"), "rows": [asdict(m) for m in metrics]}
    path.write_text(json.dumps(payload, indent=2))


def save_json(obj, path: Path | str) -> None:
    path = Path(path)
    path.parent.mkdir(parents=True, exist_ok=True)
    path.write_text(json.dumps(obj, indent=2))
