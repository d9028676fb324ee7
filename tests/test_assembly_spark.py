"""Spark assembly vs the driver-side reference assembler on random graphs.

Both modes (Algorithm 3 equi-join and the Basic cross-join baseline) must
produce exactly the reference's crossing matches, for plain and
predicate-variable queries.
"""
import numpy as np
import pytest

from repro.core.assembly import assemble, bindings
from repro.core.partial_eval import compute_pms
from repro.core.query import Query
from repro.rdf.build import distribute_mapped
from tests.helpers import (
    random_partition,
    random_triples,
    reference_assemble,
)

QUERIES = [
    Query([("?a", "p", "?b"), ("?b", "q", "?c")], name="path2"),
    Query(
        [("?a", "p", "?b"), ("?b", "q", "?c"), ("?c", "r", "?a")],
        name="triangle",
    ),
    Query([("?a", "?x", "?b"), ("?b", "q", "?c")], name="pred-var"),
]


@pytest.mark.parametrize("seed", [0, 1])
@pytest.mark.parametrize("mode", ["lec", "basic"])
@pytest.mark.parametrize("query", QUERIES, ids=lambda q: q.name)
def test_assemble_matches_reference(spark, seed, mode, query):
    rng = np.random.default_rng(seed)
    triples = random_triples(rng, n_vertices=12, n_edges=34)
    vfrag = random_partition(rng, triples, k=3)
    g = distribute_mapped(spark, triples, vfrag, 3)
    pm_df = compute_pms(g.fragment_edges, query).cache()
    pms = pm_df.toPandas().to_dict("records")
    # pandas NaN → None for the reference assembler
    pms = [
        {k: (None if isinstance(v, float) else v) for k, v in pm.items()}
        for pm in pms
    ]
    want = reference_assemble(pms, query)
    got = {
        tuple(r)
        for r in bindings(assemble(pm_df, query, mode=mode), query)
        .toPandas()
        .itertuples(index=False)
    }
    assert got == want
    g.unpersist()


def test_assemble_empty_pms_returns_empty(spark):
    query = QUERIES[0]
    from repro.core.partial_eval import pm_schema

    empty = spark.createDataFrame([], schema=pm_schema(query))
    out = assemble(empty, query)
    assert out.count() == 0
    assert bindings(out, query).count() == 0
