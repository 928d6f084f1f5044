"""Table 3 — RDF graph size and analysis time, KGLiDS vs GraphGen4Code.

Abstracts the same synthetic Kaggle corpus (1/10 of the paper's 13,800
scripts) with both systems and reports triples, unique nodes, unique
predicates, serialized size, and analysis wall-time.
"""
import time

import pandas as pd
import pytest

from repro.baselines import graphgen4code_like as g4c
from repro.core import pipeline_abstraction as pa
from repro.pipelines_corpus.generator import make_corpus

from _report import report

N_SCRIPTS_PAPER = 13_800
PAPER_TABLE3 = {
    "KGLiDS": {"triples": 16_640_400, "nodes": 3_053_416, "preds": 16,
               "size_gb": 1.49, "time_hr": 1.9},
    "GraphGen4Code": {"triples": 97_537_947, "nodes": 20_737_622, "preds": 16,
                      "size_gb": 16.55, "time_hr": 37.59},
}


@pytest.mark.benchmark(group="table3")
def test_table3_graph_size_and_analysis_time(spark, benchmark):
    _, scripts = make_corpus(
        n_datasets=230, pipelines_per_dataset=12, with_tables=False, seed=42
    )  # 2,760 scripts = 1/5 of the paper's corpus
    scripts_df = spark.createDataFrame(
        scripts[pa.SCRIPTS_COLUMNS]
    ).repartition(32).cache()
    scripts_df.count()
    rows = []

    def run():
        t0 = time.perf_counter()
        kglids_store = pa.abstract_corpus(spark, scripts_df).persist()
        kglids_triples = kglids_store.n_triples()
        kglids_t = time.perf_counter() - t0
        t0 = time.perf_counter()
        g4c_store = g4c.abstract_corpus(spark, scripts_df)
        g4c_store.persist()
        g4c_triples = g4c_store.n_triples()
        g4c_t = time.perf_counter() - t0
        for label, store, n_triples, secs in (
            ("KGLiDS", kglids_store, kglids_triples, kglids_t),
            ("GraphGen4Code", g4c_store, g4c_triples, g4c_t),
        ):
            paper = PAPER_TABLE3[label]
            rows.append(
                {
                    "system": label,
                    "triples": n_triples,
                    "paper_triples": paper["triples"],
                    "unique_nodes": store.n_unique_nodes(),
                    "paper_nodes": paper["nodes"],
                    "unique_predicates": store.n_unique_predicates(),
                    "size_mb": round(store.ntriples_size_bytes() / 1e6, 2),
                    "paper_size_gb": paper["size_gb"],
                    "analysis_s": round(secs, 2),
                    "paper_time_hr": paper["time_hr"],
                }
            )
        return rows

    benchmark.pedantic(run, rounds=1, iterations=1)
    out = pd.DataFrame(rows)
    kg, gg = out.iloc[0], out.iloc[1]
    reduction = 1 - kg["triples"] / gg["triples"]
    time_saving = 1 - kg["analysis_s"] / gg["analysis_s"]
    summary = (
        out.to_string(index=False)
        + f"\n\ngraph reduction: {reduction:.1%} (paper: >82%)"
        + f"\ntime saving: {time_saving:.1%} (paper: 95%)"
        + f"\nscripts: 2760"
          f" (paper: {N_SCRIPTS_PAPER})"
    )
    report("table3", summary)
    # Table-3 shape: far fewer triples, far less analysis time
    assert reduction > 0.60
    assert time_saving > 0.50
