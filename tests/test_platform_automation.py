"""End-to-end tests: corpus -> LiDS KG -> recommenders -> experiments.

One small platform is trained per session and shared across tests.
"""
import numpy as np
import pandas as pd
import pytest

from repro.automation import experiments
from repro.automation.cleaning import (
    CLEANING_OPERATIONS,
    mine_cleaning_labels,
)
from repro.automation.transformation import (
    TABLE_TRANSFORMS,
    mine_column_transform_labels,
    mine_scaler_labels,
)
from repro.datasets import cleaning_datasets, transformation_datasets
from repro.pipelines_corpus.generator import make_corpus


@pytest.fixture(scope="module")
def platform(spark):
    return experiments.train_platform(
        spark, n_datasets=20, pipelines_per_dataset=6, rows=120, seed=3
    )


@pytest.fixture(scope="module")
def corpus_truth():
    datasets, _ = make_corpus(
        n_datasets=20, pipelines_per_dataset=6, rows=120, seed=3
    )
    return datasets


def test_mined_cleaning_labels_mostly_match_planted(platform, corpus_truth):
    labels = mine_cleaning_labels(platform.store)
    true = {d.name: d.best_cleaning for d in corpus_truth}
    hits = (labels["op"] == labels["dataset"].map(true)).mean()
    assert hits > 0.75


def test_mined_scaler_labels_mostly_match_planted(platform, corpus_truth):
    labels = mine_scaler_labels(platform.store)
    true = {d.name: d.best_scaler for d in corpus_truth}
    hits = (labels["op"] == labels["dataset"].map(true)).mean()
    assert hits > 0.75


def test_mined_column_transforms(platform, corpus_truth):
    labels = mine_column_transform_labels(platform.store)
    assert set(labels["op"]) <= {"log", "sqrt"}
    assert len(labels) > 0


def test_cleaning_recommendation_in_vocabulary(platform):
    spec = cleaning_datasets.SPECS[0]
    pdf = cleaning_datasets.build_dataset(spec, 1)
    op = platform.cleaning.recommend_cleaning_operations(
        pdf.drop(columns=["target"])
    )
    assert op in CLEANING_OPERATIONS


def test_transformation_recommendation_in_vocabulary(platform):
    spec = transformation_datasets.SPECS[0]
    pdf, _ = transformation_datasets.build_dataset(spec, 1)
    scaler, col_ops = platform.transformation.recommend_transformations(
        pdf.drop(columns=["target"])
    )
    assert scaler in TABLE_TRANSFORMS
    assert all(v in ("log", "sqrt", "none") for v in col_ops.values())


def test_cleaning_experiment_small(platform):
    specs = [s for s in cleaning_datasets.SPECS if s.id in (1, 2, 5)]
    res = experiments.run_cleaning_experiment(platform, specs, folds=3)
    assert len(res) == 3
    # the MAR-on-target dataset degenerates the drop-nulls baseline
    horsecolic = res[res["dataset"] == "horsecolic"].iloc[0]
    assert horsecolic["baseline_f1"] == 0.0
    assert horsecolic["kglids_f1"] > 50.0
    # every KGLiDS F1 is valid and the op is from the vocabulary
    assert res["kglids_op"].isin(CLEANING_OPERATIONS).all()


def test_cleaning_oom_rows(platform):
    specs = [s for s in cleaning_datasets.SPECS if s.id == 11]
    res = experiments.run_cleaning_experiment(platform, specs, folds=2)
    assert res.iloc[0]["holoclean_f1"] is None or np.isnan(
        res.iloc[0]["holoclean_f1"]
    )
    assert res.iloc[0]["kglids_f1"] > 0  # KGLiDS unaffected by size


def test_transformation_experiment_small(platform):
    specs = [s for s in transformation_datasets.SPECS if s.id in (14, 16)]
    res = experiments.run_transformation_experiment(platform, specs, folds=3)
    assert len(res) == 2
    assert (res["kglids_acc"] > res["baseline_acc"]).all()


def test_transformation_timeout_row(platform):
    specs = [s for s in transformation_datasets.SPECS if s.id == 25]
    res = experiments.run_transformation_experiment(
        platform, specs, folds=2, autolearn_time_budget_s=0.5
    )
    assert res.iloc[0]["autolearn_status"] in ("TO", "OOM")
    assert res.iloc[0]["kglids_acc"] > 0


def test_kglids_time_does_not_blow_up_with_size(platform):
    """Fixed-size embeddings: recommendation cost is size-independent."""
    small = cleaning_datasets.build_dataset(cleaning_datasets.SPECS[0], 1)
    big = cleaning_datasets.build_dataset(cleaning_datasets.SPECS[12], 1)
    import time

    t0 = time.perf_counter()
    platform.cleaning.recommend_cleaning_operations(small.drop(columns=["target"]))
    t_small = time.perf_counter() - t0
    t0 = time.perf_counter()
    platform.cleaning.recommend_cleaning_operations(big.drop(columns=["target"]))
    t_big = time.perf_counter() - t0
    # 100x rows must not cost 100x time (sampled, fixed-size embeddings)
    assert t_big < max(0.2, t_small * 60)
