"""Table 3 entrypoint: KG size + analysis time, KGLiDS vs GraphGen4Code."""
import time

from _session import get_spark

from repro.baselines import graphgen4code_like as g4c
from repro.core import pipeline_abstraction as pa
from repro.pipelines_corpus.generator import make_corpus


def main() -> None:
    spark = get_spark("table3")
    _, scripts = make_corpus(
        n_datasets=230, pipelines_per_dataset=12, with_tables=False, seed=42
    )
    scripts_df = spark.createDataFrame(scripts[pa.SCRIPTS_COLUMNS]).repartition(32).cache()
    print(f"corpus: {scripts_df.count()} scripts (paper: 13,800)")
    for label, fn in (("KGLiDS", pa.abstract_corpus),
                      ("GraphGen4Code", g4c.abstract_corpus)):
        t0 = time.perf_counter()
        store = fn(spark, scripts_df).persist()
        n = store.n_triples()
        secs = time.perf_counter() - t0
        print(f"  {label:>14}: triples={n:>9,} nodes={store.n_unique_nodes():>9,} "
              f"preds={store.n_unique_predicates()} "
              f"size={store.ntriples_size_bytes()/1e6:8.1f}MB time={secs:7.1f}s")
    spark.stop()


if __name__ == "__main__":
    main()
