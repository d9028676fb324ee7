"""Table II benchmark: YQ1–YQ4 on YAGO2-lite through the full engine."""
import pytest

from repro.core.engine import GStoreD
from repro.rdf.queries import YAGO_QUERIES


@pytest.mark.parametrize("qname", list(YAGO_QUERIES))
def test_table2_yago(benchmark, yago_graph, qname):
    engine = GStoreD(yago_graph, variant="full")

    def run():
        _, metrics = engine.run(YAGO_QUERIES[qname])
        return metrics

    metrics = benchmark.pedantic(run, rounds=1, iterations=1)
    benchmark.extra_info.update(metrics.row())
    assert metrics.total_ms >= 0
