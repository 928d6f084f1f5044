"""Table 5 entrypoint: cleaning F1 — baseline vs HoloClean-like vs KGLiDS."""
from _session import get_spark

from repro.automation import experiments
from repro.datasets.cleaning_datasets import SPECS


def main() -> None:
    spark = get_spark("table5")
    platform = experiments.train_platform(
        spark, n_datasets=40, pipelines_per_dataset=8, rows=150, seed=0
    )
    res = experiments.run_cleaning_experiment(platform, SPECS, folds=3)
    print(res.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
