"""Table 4 entrypoint: graph breakdown per modelled aspect, both systems."""
from _session import get_spark

from repro.baselines import graphgen4code_like as g4c
from repro.core import pipeline_abstraction as pa
from repro.pipelines_corpus.generator import make_corpus


def main() -> None:
    spark = get_spark("table4")
    _, scripts = make_corpus(
        n_datasets=40, pipelines_per_dataset=10, with_tables=False, seed=7
    )
    scripts_df = spark.createDataFrame(scripts[pa.SCRIPTS_COLUMNS]).cache()
    for label, fn in (("KGLiDS", pa.abstract_corpus),
                      ("GraphGen4Code", g4c.abstract_corpus)):
        breakdown = fn(spark, scripts_df).aspect_breakdown()
        print(f"\n=== {label} ===")
        for row in breakdown.itertuples(index=False):
            print(f"  {row.aspect:>22}: {row.n_triples:>8,} ({row.pct:5.1f}%)")
    spark.stop()


if __name__ == "__main__":
    main()
