"""Tests for the synthetic Kaggle pipeline corpus (substitution S6)."""
import ast

import pytest

from repro.core.pipeline_abstraction import SCRIPTS_COLUMNS, analyze_script
from repro.pipelines_corpus.generator import (
    BEST_CLEANING_OF_KIND,
    BEST_SCALER_OF_SHAPE,
    CorpusDataset,
    make_corpus,
)


@pytest.fixture(scope="module")
def corpus():
    return make_corpus(n_datasets=10, pipelines_per_dataset=4, rows=80, seed=1)


def test_corpus_shape(corpus):
    datasets, scripts = corpus
    assert len(datasets) == 10
    assert len(scripts) == 40
    assert list(scripts.columns) == SCRIPTS_COLUMNS


def test_scripts_are_valid_python(corpus):
    _, scripts = corpus
    for s in scripts["script"]:
        ast.parse(s)  # raises on invalid syntax


def test_scripts_abstract_cleanly(corpus):
    _, scripts = corpus
    stmts = analyze_script(scripts["script"].iloc[0])
    calls = {s.call for s in stmts if s.call}
    assert "pandas.read_csv" in calls
    assert any(c and c.startswith("sklearn") for c in calls)


def test_dataset_read_matches_metadata(corpus):
    _, scripts = corpus
    for _, row in scripts.head(5).iterrows():
        stmts = analyze_script(row["script"])
        reads = [s.dataset_read for s in stmts if s.dataset_read]
        assert reads and reads[0][0] == row["dataset"]


def test_tables_have_planted_missingness(corpus):
    datasets, _ = corpus
    for ds in datasets:
        assert ds.table is not None
        assert ds.table.isna().any().any()
        assert "target" in ds.table.columns


def test_traits_map_to_best_ops(corpus):
    datasets, _ = corpus
    for ds in datasets:
        assert ds.best_cleaning == BEST_CLEANING_OF_KIND[ds.kind]
        assert ds.best_scaler == BEST_SCALER_OF_SHAPE[ds.shape]


def test_majority_of_pipelines_use_best_cleaning(corpus):
    datasets, scripts = corpus
    by_name: dict[str, CorpusDataset] = {d.name: d for d in datasets}
    hits = total = 0
    for _, row in scripts.iterrows():
        ds = by_name[row["dataset"]]
        marker = {
            "Fillna": ".fillna(",
            "Interpolate": ".interpolate(",
            "SimpleImputer": "SimpleImputer(",
            "KNNImputer": "KNNImputer(",
            "IterativeImputer": "IterativeImputer(",
        }[ds.best_cleaning]
        total += 1
        hits += marker in row["script"]
    assert hits / total > 0.5


def test_votes_favor_best_pipelines(corpus):
    datasets, scripts = corpus
    by_name = {d.name: d for d in datasets}
    best_votes, other_votes = [], []
    for _, row in scripts.iterrows():
        ds = by_name[row["dataset"]]
        marker = ds.best_cleaning.replace("Fillna", ".fillna(")
        (best_votes if marker in row["script"] else other_votes).append(row["votes"])
    assert sum(best_votes) / max(1, len(best_votes)) > sum(other_votes) / max(
        1, len(other_votes)
    )


def test_no_tables_mode():
    datasets, scripts = make_corpus(
        n_datasets=3, pipelines_per_dataset=2, with_tables=False, seed=2
    )
    assert all(d.table is None for d in datasets)
    assert len(scripts) == 6


def test_determinism():
    a = make_corpus(n_datasets=3, pipelines_per_dataset=2, seed=4)[1]
    b = make_corpus(n_datasets=3, pipelines_per_dataset=2, seed=4)[1]
    assert a.equals(b)
