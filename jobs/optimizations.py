"""Supplementary (Fig. 9 as a table): ablation of the three optimizations.

Runs the non-star benchmark queries of LUBM-lite and YAGO2-lite through the
four engine variants (Basic / LA / LO / Full) and reports total times.
Run at a reduced scale so the Basic cross-join baseline stays tractable —
mirroring the paper's use of LUBM 100M (not 1B) for this experiment.

Writes results/optimizations.json and prints the comparison.
"""
from pyspark.sql import SparkSession

from repro.core.engine import GStoreD, VARIANTS
from repro.rdf.build import distribute
from repro.rdf.datasets import lubm, yago2
from repro.rdf.queries import LUBM_QUERIES, YAGO_QUERIES
from repro.tables import RESULTS_DIR, save_json

ABLATION_SCALE = {
    "lubm": dict(universities=20, seed=7),
    "yago2": dict(persons=800, seed=11),
}
ABLATION_K = 8
NON_STAR = {
    "lubm": ["LQ1", "LQ3", "LQ6", "LQ7"],
    "yago2": ["YQ1", "YQ2", "YQ3", "YQ4"],
}


def main(spark: SparkSession) -> dict:
    out: dict[str, dict[str, dict[str, dict[str, int]]]] = {}
    for ds, gen in (("lubm", lubm), ("yago2", yago2)):
        pdf = gen(**ABLATION_SCALE[ds])
        graph = distribute(spark, pdf, ABLATION_K, strategy="hash")
        queries = LUBM_QUERIES if ds == "lubm" else YAGO_QUERIES
        out[ds] = {}
        for qname in NON_STAR[ds]:
            out[ds][qname] = {}
            for variant in VARIANTS:
                _, m = GStoreD(graph, variant=variant).run(queries[qname])
                out[ds][qname][variant] = {
                    "total_ms": m.total_ms,
                    "asm_ms": m.assembly_time_ms,
                    "n_pms": m.n_pms,
                }
        graph.unpersist()
    save_json(out, RESULTS_DIR / "optimizations.json")
    print("Optimization ablation — total ms (assembly ms / #PMs entering assembly)")
    print(f"{'query':8} " + " ".join(v.rjust(18) for v in VARIANTS))
    for ds in out:
        for qname, row in out[ds].items():
            cells = [
                f"{row[v]['total_ms']} ({row[v]['asm_ms']}/{row[v]['n_pms']})"
                for v in VARIANTS
            ]
            print(f"{qname:8} " + " ".join(c.rjust(18) for c in cells))
    return out


if __name__ == "__main__":
    from common import get_spark

    spark = get_spark("optimizations")
    main(spark)
    spark.stop()
