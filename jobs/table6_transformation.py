"""Table 6 entrypoint: transformation accuracy — baseline vs AutoLearn-like
vs KGLiDS."""
from _session import get_spark

from repro.automation import experiments
from repro.datasets.transformation_datasets import SPECS


def main() -> None:
    spark = get_spark("table6")
    platform = experiments.train_platform(
        spark, n_datasets=40, pipelines_per_dataset=8, rows=150, seed=0
    )
    res = experiments.run_transformation_experiment(
        platform, SPECS, folds=3, autolearn_time_budget_s=6.0
    )
    print(res.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
