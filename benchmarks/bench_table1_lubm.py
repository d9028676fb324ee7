"""Table I benchmark: LQ1–LQ7 on LUBM-lite through the full engine."""
import pytest

from repro.core.engine import GStoreD
from repro.rdf.queries import LUBM_QUERIES


@pytest.mark.parametrize("qname", list(LUBM_QUERIES))
def test_table1_lubm(benchmark, lubm_graph, qname):
    engine = GStoreD(lubm_graph, variant="full")

    def run():
        _, metrics = engine.run(LUBM_QUERIES[qname])
        return metrics

    metrics = benchmark.pedantic(run, rounds=1, iterations=1)
    benchmark.extra_info.update(metrics.row())
    assert metrics.total_ms >= 0
