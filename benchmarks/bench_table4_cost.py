"""Table IV benchmark: the §VII partitioning cost model per strategy."""
import pytest

from repro.rdf.cost_model import partitioning_cost
from repro.rdf.datasets import lubm, to_spark, yago2
from repro.rdf.partition import PARTITIONERS
from repro.tables import BENCH_K, BENCH_SCALE


@pytest.fixture(scope="module")
def bench_triples(spark):
    out = {
        "lubm": to_spark(spark, lubm(**BENCH_SCALE["lubm"])).cache(),
        "yago2": to_spark(spark, yago2(**BENCH_SCALE["yago2"])).cache(),
    }
    for df in out.values():
        df.count()
    yield out
    for df in out.values():
        df.unpersist()


@pytest.mark.parametrize("dataset", ["yago2", "lubm"])
@pytest.mark.parametrize("strategy", sorted(PARTITIONERS))
def test_table4_cost(benchmark, bench_triples, dataset, strategy):
    triples = bench_triples[dataset]

    def run():
        vf = PARTITIONERS[strategy](triples, BENCH_K)
        return partitioning_cost(triples, vf)

    cost = benchmark.pedantic(run, rounds=1, iterations=1)
    benchmark.extra_info.update(
        {
            "dataset": dataset,
            "strategy": strategy,
            "cost": cost.cost,
            "n_crossing": cost.n_crossing,
            "max_fragment_edges": cost.max_fragment_edges,
        }
    )
    assert cost.cost >= 0
