"""Supplementary online comparison: gStore^D (full) vs S2RDF-lite.

The paper's Fig. 12 compares gStore^D against four released systems; figures
are out of scope here, but S2RDF's strategy — vertical-partitioning Spark
SQL joins over the whole triple table — is exactly
:func:`repro.core.bgp_spark.evaluate_bgp`, so we report it as the
cloud-baseline comparator on the benchmark queries.

Writes results/comparison.json and prints query times (ms).
"""
import time

from repro.core.bgp_spark import evaluate_bgp
from repro.core.engine import GStoreD
from repro.rdf.queries import ALL_QUERIES
from repro.tables import RESULTS_DIR, bench_graph, save_json


def main(spark) -> dict:
    out: dict[str, dict[str, dict[str, int]]] = {}
    for ds in ("lubm", "yago2", "btc"):
        pdf, graph = bench_graph(spark, ds)
        engine = GStoreD(graph, variant="full")
        out[ds] = {}
        for qname, query in ALL_QUERIES[ds].items():
            t0 = time.perf_counter()
            df = evaluate_bgp(graph.triples, query).cache()
            n_s2rdf = df.count()
            s2rdf_ms = int((time.perf_counter() - t0) * 1000)
            df.unpersist()
            _, m = engine.run(query)
            assert m.n_matches == n_s2rdf, (qname, m.n_matches, n_s2rdf)
            out[ds][qname] = {"s2rdf_lite_ms": s2rdf_ms, "gstored_ms": m.total_ms}
        graph.unpersist()
    save_json(out, RESULTS_DIR / "comparison.json")
    print("Online comparison — total time (ms)")
    print(f"{'query':8} {'S2RDF-lite':>12} {'gStoreD':>10}")
    for ds in out:
        for qname, row in out[ds].items():
            print(f"{qname:8} {row['s2rdf_lite_ms']:>12} {row['gstored_ms']:>10}")
    return out


if __name__ == "__main__":
    from common import get_spark

    spark = get_spark("comparison")
    main(spark)
    spark.stop()
