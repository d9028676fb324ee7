"""Table III benchmark: BQ1–BQ7 on BTC-lite through the full engine."""
import pytest

from repro.core.engine import GStoreD
from repro.rdf.queries import BTC_QUERIES


@pytest.mark.parametrize("qname", list(BTC_QUERIES))
def test_table3_btc(benchmark, btc_graph, qname):
    engine = GStoreD(btc_graph, variant="full")

    def run():
        _, metrics = engine.run(BTC_QUERIES[qname])
        return metrics

    metrics = benchmark.pedantic(run, rounds=1, iterations=1)
    benchmark.extra_info.update(metrics.row())
    assert metrics.total_ms >= 0
