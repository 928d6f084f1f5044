"""Data Global Schema Builder — Algorithm 3 — as Spark jobs.

Builds the dataset graph from column profiles:

1. a metadata subgraph (dataset/table/column hierarchy + statistics),
   produced distributedly with ``mapInPandas`` (Alg. 3 lines 2-5);
2. similarity edges between column pairs *of the same fine-grained type
   in different tables* (lines 6-19): label similarity from word
   embeddings (threshold α), content similarity from CoLR embeddings
   (threshold θ) — except booleans, compared on true-ratio (threshold β).

The pairwise stage broadcasts the per-type embedding matrices and lets
each partition compare its own columns against all later columns of the
same type with one matmul — the paper's "MapReduce fashion" with the
quadratic work spread across executors and no quadratic shuffle.
"""
from __future__ import annotations

import math
from collections.abc import Iterator
from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from . import ontology as O
from .triples import TRIPLE_SCHEMA, TripleBuilder, TripleStore
from .types import FineGrainedType


@dataclass(frozen=True)
class SimilarityThresholds:
    """User-defined thresholds of Algorithm 3 (α: label, β: bool, θ: content)."""

    alpha: float = 0.75
    beta: float = 0.90
    theta: float = 0.95


def _column_uri(dataset: str, table: str, column: str) -> str:
    return O.res(dataset, table, column)


def _metadata_partition(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
    for batch in batches:
        tb = TripleBuilder(graph=O.res("datasetGraph"))
        for r in batch.itertuples(index=False):
            col = _column_uri(r.dataset, r.table, r.column)
            tab = O.res(r.dataset, r.table)
            ds = O.res(r.dataset)
            tb.add(col, O.RDF_TYPE, O.COLUMN)
            tb.add(col, O.RDFS_LABEL, r.column)
            tb.add(col, O.IS_PART_OF, tab)
            tb.add(tab, O.RDF_TYPE, O.TABLE)
            tb.add(tab, O.RDFS_LABEL, r.table)
            tb.add(tab, O.IS_PART_OF, ds)
            tb.add(ds, O.RDF_TYPE, O.DATASET)
            tb.add(col, O.HAS_TYPE, r.fgt)
            tb.add(col, O.HAS_TOTAL_VALUES, str(r.n_rows))
            tb.add(col, O.HAS_NULL_COUNT, str(r.n_nulls))
            tb.add(col, O.HAS_DISTINCT_VALUES, str(r.n_distinct))
            if r.fgt == FineGrainedType.BOOLEAN.value and r.true_ratio is not None:
                tb.add(col, O.HAS_TRUE_RATIO, f"{r.true_ratio:.4f}")
        yield tb.to_pandas()


def build_metadata_subgraph(profiles: DataFrame) -> DataFrame:
    """Alg. 3 lines 2-5: per-partition metadata subgraphs, as triples.

    Table/dataset-level triples are emitted once per column and then
    deduplicated (their subjects repeat across partitions).
    """
    return profiles.mapInPandas(_metadata_partition, TRIPLE_SCHEMA).dropDuplicates(
        ["g", "s", "p", "o"]
    )


def _similarity_partition_factory(bc, thresholds: SimilarityThresholds):
    """Worker over a partition of columns: compare each against all
    same-type columns with a greater global index (i<j dedup)."""

    def worker(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        side = bc.value  # {fgt: {"ids", "tables", "content", "label", "true_ratio", "index_of"}}
        for batch in batches:
            tb = TripleBuilder(graph=O.res("datasetGraph"))
            for r in batch.itertuples(index=False):
                data = side.get(r.fgt)
                if data is None:
                    continue
                me = data["index_of"][(r.dataset, r.table, r.column)]
                later = slice(me + 1, None)
                other_tables = data["tables"][later]
                if len(other_tables) == 0:
                    continue
                diff_table = other_tables != r.table
                my_uri = _column_uri(r.dataset, r.table, r.column)
                # label similarity (α) — unit-normalized at build time
                lab = data["label"][later] @ data["label"][me]
                # content similarity: θ on cosine, or β on true-ratio
                if r.fgt == FineGrainedType.BOOLEAN.value:
                    tr = data["true_ratio"][later]
                    mine = data["true_ratio"][me]
                    content = 1.0 - np.abs(tr - mine)
                    content_thr = thresholds.beta
                else:
                    content = data["content"][later] @ data["content"][me]
                    content_thr = thresholds.theta
                for j in np.nonzero(
                    diff_table & ((lab >= thresholds.alpha) | (content >= content_thr))
                )[0]:
                    other_uri = data["ids"][me + 1 + j]
                    if lab[j] >= thresholds.alpha:
                        tb.add(my_uri, O.LABEL_SIMILARITY, other_uri, w=float(lab[j]))
                    if content[j] >= content_thr:
                        tb.add(
                            my_uri, O.CONTENT_SIMILARITY, other_uri, w=float(content[j])
                        )
            yield tb.to_pandas()

    return worker


def _normalize(mat: np.ndarray) -> np.ndarray:
    norms = np.linalg.norm(mat, axis=1, keepdims=True)
    norms[norms == 0] = 1.0
    return mat / norms


def build_similarity_edges(
    spark: SparkSession,
    profiles: DataFrame,
    thresholds: SimilarityThresholds = SimilarityThresholds(),
) -> DataFrame:
    """Alg. 3 lines 6-19: same-type pairwise similarity edges as triples."""
    pdf = profiles.select(
        "dataset", "table", "column", "fgt", "true_ratio", "embedding",
        "label_embedding",
    ).toPandas()
    side: dict[str, dict] = {}
    for fgt, grp in pdf.groupby("fgt"):
        grp = grp.reset_index(drop=True)
        side[fgt] = {
            "ids": np.array(
                [
                    _column_uri(r.dataset, r.table, r.column)
                    for r in grp.itertuples(index=False)
                ]
            ),
            "tables": grp["table"].to_numpy(),
            "content": _normalize(np.stack(grp["embedding"].to_numpy())),
            "label": _normalize(np.stack(grp["label_embedding"].to_numpy())),
            "true_ratio": grp["true_ratio"].fillna(0.5).to_numpy(dtype="float64"),
            "index_of": {
                (r.dataset, r.table, r.column): i
                for i, r in enumerate(grp.itertuples(index=False))
            },
        }
    bc = spark.sparkContext.broadcast(side)
    worker = _similarity_partition_factory(bc, thresholds)
    return profiles.select(
        "dataset", "table", "column", "fgt"
    ).mapInPandas(worker, TRIPLE_SCHEMA)


def build_dataset_graph(
    spark: SparkSession,
    profiles: DataFrame,
    thresholds: SimilarityThresholds = SimilarityThresholds(),
) -> TripleStore:
    """Alg. 3 lines 20-24: union of metadata and similarity subgraphs."""
    meta = build_metadata_subgraph(profiles)
    sim = build_similarity_edges(spark, profiles, thresholds)
    return TripleStore(spark, meta.unionByName(sim))


def nan_to_none(x: float) -> float | None:
    return None if x is None or (isinstance(x, float) and math.isnan(x)) else x
