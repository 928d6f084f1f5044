"""LiDS graph assembly (§3.3): dataset ∪ library ∪ pipeline graphs.

The end-to-end KG Governor path: profile the datasets (Algorithm 2),
build the Data Global Schema (Algorithm 3), abstract the pipeline
scripts into named graphs (Algorithm 1), link predicted dataset-usage
nodes against the dataset graph, and union everything into the single
Web-publishable LiDS graph.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from . import graph_linker
from .pipeline_abstraction import abstract_corpus
from .profiler import profile_tables
from .schema_builder import SimilarityThresholds, build_dataset_graph
from .triples import TripleStore


def build_lids_graph(
    spark: SparkSession,
    tables_by_dataset: dict[str, dict[str, pd.DataFrame]],
    scripts: DataFrame | None = None,
    thresholds: SimilarityThresholds = SimilarityThresholds(),
) -> TripleStore:
    """Construct the full LiDS graph for datasets + (optionally) scripts.

    ``tables_by_dataset`` maps dataset name -> {table name -> pandas df};
    ``scripts`` follows ``pipeline_abstraction.SCRIPTS_COLUMNS``.
    Pipeline graphs are verified by the Graph Linker before the union,
    so dangling Predicted Dataset Usage nodes never reach the KG.
    """
    dataset_store: TripleStore | None = None
    for dataset, tables in tables_by_dataset.items():
        profiles = profile_tables(spark, tables, dataset)
        part = build_dataset_graph(spark, profiles, thresholds)
        dataset_store = part if dataset_store is None else dataset_store.union(part)
    if dataset_store is None:
        dataset_store = TripleStore.empty(spark)
    if scripts is None:
        return dataset_store
    pipeline_store = abstract_corpus(spark, scripts)
    linked = graph_linker.link(pipeline_store, dataset_store)
    return dataset_store.union(linked)
