"""Table 5 — F1 scores for data cleaning: baseline vs HoloClean-like vs
KGLiDS over the 13 evaluation datasets.

Trains the platform (corpus -> LiDS KG -> GNN recommender) and runs the
full Table-5 protocol: clean each dataset with each system, train a
random forest, report cross-validated weighted F1 next to the paper's
numbers. OOM rows reproduce HoloClean's out-of-memory failures.
"""
import numpy as np
import pandas as pd
import pytest

from repro.automation import experiments
from repro.datasets.cleaning_datasets import PAPER_TABLE5, SPECS

from _report import report


@pytest.mark.benchmark(group="table5")
def test_table5_cleaning_f1(spark, benchmark):
    platform = experiments.train_platform(
        spark, n_datasets=40, pipelines_per_dataset=8, rows=150, seed=0
    )
    holder = {}

    def run():
        holder["res"] = experiments.run_cleaning_experiment(
            platform, SPECS, folds=3
        )
        return holder["res"]

    benchmark.pedantic(run, rounds=1, iterations=1)
    res = holder["res"]
    paper = pd.DataFrame(
        [
            {"dataset": k, "paper_baseline": v[0],
             "paper_holoclean": "OOM" if v[1] is None else v[1],
             "paper_kglids": v[2]}
            for k, v in PAPER_TABLE5.items()
        ]
    )
    merged = res.merge(paper, on="dataset")
    merged["holoclean_f1"] = merged["holoclean_f1"].where(
        merged["holoclean_f1"].notna(), "OOM"
    )
    cols = ["id", "dataset", "baseline_f1", "paper_baseline", "holoclean_f1",
            "paper_holoclean", "kglids_f1", "paper_kglids", "kglids_op",
            "t_holoclean_s", "t_kglids_s"]
    report("table5", merged[cols].to_string(index=False))

    # paper shape: HoloClean OOMs on the three largest datasets
    ooms = merged[merged["holoclean_f1"] == "OOM"]["dataset"].tolist()
    assert set(ooms) == {"higgs", "APSFailure", "albert"}
    # the MAR-on-target datasets zero out the drop-nulls baseline
    zeros = merged[merged["baseline_f1"] == 0.0]["dataset"].tolist()
    assert set(zeros) == {"horsecolic", "creditg", "albert"}
    # KGLiDS completes everything and is comparable-or-better on most of
    # the datasets HoloClean completes
    completed = merged[merged["holoclean_f1"] != "OOM"]
    wins = (
        completed["kglids_f1"] >= completed["holoclean_f1"].astype(float) - 2.0
    ).mean()
    assert wins >= 0.5
    assert (merged["kglids_f1"] > 0).all()
    # KGLiDS is faster than HoloClean on the datasets both complete
    t = completed[completed["t_holoclean_s"] > 0]
    assert (t["t_kglids_s"] <= t["t_holoclean_s"] * 1.5).mean() >= 0.6
