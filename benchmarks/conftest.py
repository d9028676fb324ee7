"""Shared benchmark fixtures: one benchmark-scale graph per dataset.

Each bench run regenerates a table of the paper (Tables I–IV): the
pytest-benchmark timing is the per-query wall clock, and the stage metrics
(shipment sizes, PM/match counts) are attached as ``extra_info`` so they
land in the benchmark JSON next to the timings.
"""
import pytest

from repro.tables import bench_graph


@pytest.fixture(scope="session")
def lubm_graph(spark):
    pdf, g = bench_graph(spark, "lubm")
    yield g
    g.unpersist()


@pytest.fixture(scope="session")
def yago_graph(spark):
    pdf, g = bench_graph(spark, "yago2")
    yield g
    g.unpersist()


@pytest.fixture(scope="session")
def btc_graph(spark):
    pdf, g = bench_graph(spark, "btc")
    yield g
    g.unpersist()
