"""Table 6 — Accuracy for data transformation: baseline vs AutoLearn-like
vs KGLiDS over the 17 evaluation datasets.

Reproduces the §6.3.2 protocol: apply each system's transformations,
train the downstream classifier, report cross-validated accuracy next
to the paper's numbers. TO/OOM rows reproduce AutoLearn's timeouts
(ids 24-29) and out-of-memory failure (poker).
"""
import pandas as pd
import pytest

from repro.automation import experiments
from repro.datasets.transformation_datasets import PAPER_TABLE6, SPECS

from _report import report


@pytest.mark.benchmark(group="table6")
def test_table6_transformation_accuracy(spark, benchmark):
    platform = experiments.train_platform(
        spark, n_datasets=40, pipelines_per_dataset=8, rows=150, seed=0
    )
    holder = {}

    def run():
        holder["res"] = experiments.run_transformation_experiment(
            platform, SPECS, folds=3, autolearn_time_budget_s=6.0
        )
        return holder["res"]

    benchmark.pedantic(run, rounds=1, iterations=1)
    res = holder["res"]
    paper = pd.DataFrame(
        [
            {
                "dataset": k,
                "paper_baseline": v[0],
                "paper_autolearn": f"{v[1]} ({'TO/OOM' if v[2] is None else v[2]})",
                "paper_kglids": v[3],
            }
            for k, v in PAPER_TABLE6.items()
        ]
    )
    merged = res.merge(paper, on="dataset")
    merged["autolearn"] = merged.apply(
        lambda r: r["autolearn_status"]
        if r["autolearn_status"] != "ok"
        else r["autolearn_acc"],
        axis=1,
    )
    cols = ["id", "dataset", "baseline_acc", "paper_baseline", "autolearn",
            "paper_autolearn", "kglids_acc", "paper_kglids", "kglids_scaler",
            "t_autolearn_s", "t_kglids_s"]
    report("table6", merged[cols].to_string(index=False))

    # paper shape: AutoLearn fails on the large half, KGLiDS never does
    failures = merged[merged["autolearn_status"] != "ok"]
    assert len(failures) >= 4
    assert set(failures["id"]) <= set(range(22, 31))
    assert (merged["kglids_acc"] > 0).all()
    # KGLiDS matches or beats the raw baseline on ~all datasets
    assert (merged["kglids_acc"] >= merged["baseline_acc"] - 1.0).mean() >= 0.85
    # and beats AutoLearn where AutoLearn completes, on most datasets
    done = merged[merged["autolearn_status"] == "ok"]
    if len(done):
        assert (
            done["kglids_acc"] >= done["autolearn_acc"] - 2.0
        ).mean() >= 0.6
    # KGLiDS transformation time stays flat while AutoLearn's grows
    small = merged[merged["id"] <= 20]["t_kglids_s"].mean()
    large = merged[merged["id"] >= 28]["t_kglids_s"].mean()
    assert large < small * 30 + 5
