"""Supplementary ablation benchmark (Fig. 9 as a table): Basic vs LA vs LO
vs Full on the non-star LUBM-lite queries at reduced scale (the Basic
cross-join baseline is the paper's motivating bottleneck)."""
import pytest

from repro.core.engine import GStoreD, VARIANTS
from repro.rdf.build import distribute
from repro.rdf.datasets import lubm
from repro.rdf.queries import LUBM_QUERIES

NON_STAR = ["LQ1", "LQ3", "LQ6", "LQ7"]


@pytest.fixture(scope="module")
def ablation_graph(spark):
    g = distribute(spark, lubm(universities=10, seed=7), 8, strategy="hash")
    yield g
    g.unpersist()


@pytest.mark.parametrize("variant", VARIANTS)
@pytest.mark.parametrize("qname", NON_STAR)
def test_ablation(benchmark, ablation_graph, qname, variant):
    engine = GStoreD(ablation_graph, variant=variant)

    def run():
        _, metrics = engine.run(LUBM_QUERIES[qname])
        return metrics

    metrics = benchmark.pedantic(run, rounds=1, iterations=1)
    benchmark.extra_info.update(metrics.row())
    benchmark.extra_info["variant"] = variant
    assert metrics.total_ms >= 0
