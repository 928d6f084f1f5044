"""Table 4 — Breakdown of the generated graphs by modelled aspect.

Abstracts a corpus with both systems and groups each graph's triples by
the Table-4 aspect taxonomy, reporting count and percentage per aspect
next to the paper's percentages.
"""
import pandas as pd
import pytest

from repro.baselines import graphgen4code_like as g4c
from repro.core import pipeline_abstraction as pa
from repro.pipelines_corpus.generator import make_corpus

from _report import report

PAPER_PCT = {
    "KGLiDS": {
        "dataset_reads": 0.2, "library_hierarchy": 0.1, "rdf_node_types": 15.3,
        "column_reads": 21.1, "library_calls": 3.0, "code_flow": 12.7,
        "data_flow": 7.6, "control_flow_type": 4.9, "func_parameters": 22.4,
        "statement_text": 12.7,
    },
    "GraphGen4Code": {
        "statement_location": 4.1, "variable_names": 1.0,
        "func_parameter_order": 25.8, "column_reads": 2.0,
        "library_calls": 15.6, "code_flow": 20.8, "data_flow": 13.6,
        "control_flow_type": 1.2, "func_parameters": 7.7,
        "statement_text": 8.1,
    },
}


@pytest.mark.benchmark(group="table4")
def test_table4_aspect_breakdown(spark, benchmark):
    _, scripts = make_corpus(
        n_datasets=40, pipelines_per_dataset=10, with_tables=False, seed=7
    )
    scripts_df = spark.createDataFrame(scripts[pa.SCRIPTS_COLUMNS]).cache()
    scripts_df.count()
    results = {}

    def run():
        results["KGLiDS"] = pa.abstract_corpus(spark, scripts_df).aspect_breakdown()
        results["GraphGen4Code"] = g4c.abstract_corpus(
            spark, scripts_df
        ).aspect_breakdown()
        return results

    benchmark.pedantic(run, rounds=1, iterations=1)
    lines = []
    for system, pdf in results.items():
        pdf = pdf.copy()
        pdf["paper_pct"] = pdf["aspect"].map(PAPER_PCT[system]).fillna("-")
        pdf["pct"] = pdf["pct"].round(1)
        lines.append(f"--- {system} ---\n{pdf.to_string(index=False)}")
    report("table4", "\n\n".join(lines))

    kglids = results["KGLiDS"].set_index("aspect")["pct"]
    g4c_pct = results["GraphGen4Code"].set_index("aspect")["pct"]
    # KGLiDS models data-science aspects G4C does not, and vice versa
    assert "dataset_reads" in kglids.index
    assert "library_hierarchy" in kglids.index
    assert "rdf_node_types" in kglids.index
    assert "statement_location" not in kglids.index
    assert "statement_location" in g4c_pct.index
    assert "func_parameter_order" in g4c_pct.index
    assert "rdf_node_types" not in g4c_pct.index
    # G4C is dominated by local syntactic bookkeeping (paper: ~30%)
    syntactic = g4c_pct.get("func_parameter_order", 0) + g4c_pct.get(
        "statement_location", 0
    )
    assert syntactic > 15
