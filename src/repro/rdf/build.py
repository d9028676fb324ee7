"""Convenience builder: pandas triples + strategy name → DistributedGraph."""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.rdf.datasets import to_spark
from repro.rdf.graph import DistributedGraph, build_graph
from repro.rdf.partition import PARTITIONERS


def distribute(
    spark: SparkSession,
    triples_pdf: pd.DataFrame,
    k: int,
    *,
    strategy: str = "hash",
) -> DistributedGraph:
    """Partition a triple table into ``k`` fragments with a named strategy."""
    triples = to_spark(spark, triples_pdf).cache()
    vertex_frag = PARTITIONERS[strategy](triples, k).cache()
    return build_graph(spark, triples, vertex_frag, k)


def distribute_mapped(
    spark: SparkSession,
    triples_pdf: pd.DataFrame,
    vertex_frag_pdf: pd.DataFrame,
    k: int,
) -> DistributedGraph:
    """Build a graph from an explicit (v, frag) assignment (e.g. the paper's
    running example or administratively-partitioned data)."""
    triples = to_spark(spark, triples_pdf).cache()
    vertex_frag = spark.createDataFrame(
        vertex_frag_pdf.astype({"frag": "int32"})
    ).cache()
    return build_graph(spark, triples, vertex_frag, k)
