"""Tests for Pipeline Abstraction (Algorithm 1) on the Figure-3 example."""
import pandas as pd
import pytest

from repro.core import ontology as O
from repro.core.pipeline_abstraction import (
    SCRIPTS_COLUMNS,
    abstract_corpus,
    analyze_script,
    build_library_graph,
    statements_to_triples,
)

FIGURE3 = """
import pandas as pd
from sklearn.impute import SimpleImputer
from sklearn.preprocessing import StandardScaler, LabelEncoder
from sklearn.model_selection import train_test_split
from sklearn.ensemble import RandomForestClassifier
from sklearn.metrics import accuracy_score

df = pd.read_csv('titanic/train.csv')
X, y = df.drop('Survived', axis=1), df['Survived']
imputer = SimpleImputer(strategy='most_frequent')
X['Sex'] = LabelEncoder().fit_transform(X['Sex'])
X['Age'] = imputer.fit_transform(X['Age'])
scaler = StandardScaler()
X['NormalizedAge'] = scaler.fit_transform(X['Age'])
X_train, y_train, X_test, y_test = train_test_split(X, y, 0.2)
clf = RandomForestClassifier(50, max_depth=10)
clf.fit(X_train, y_train)
print(accuracy_score(y_test, clf.predict(X_test)))
df.head()
"""


@pytest.fixture(scope="module")
def stmts():
    return analyze_script(FIGURE3)


def _by_call(stmts, name):
    return next(s for s in stmts if s.call == name)


def test_read_csv_detected_as_dataset_read(stmts):
    s = _by_call(stmts, "pandas.read_csv")
    assert s.dataset_read == ("titanic", "train")


def test_return_type_from_documentation(stmts):
    assert _by_call(stmts, "pandas.read_csv").return_type == "pandas.DataFrame"


def test_implicit_parameter_names_resolved(stmts):
    """RandomForestClassifier(50, ...) -> n_estimators=50 via the docs."""
    s = _by_call(stmts, "sklearn.ensemble.RandomForestClassifier")
    assert ("n_estimators", "50") in s.parameters
    assert ("max_depth", "10") in s.parameters


def test_default_parameters_added(stmts):
    s = _by_call(stmts, "sklearn.ensemble.RandomForestClassifier")
    defaults = dict(s.default_parameters)
    assert "criterion" in defaults and "min_samples_split" in defaults


def test_column_reads_detected_with_table_binding(stmts):
    cols = {c for s in stmts for c in s.column_reads}
    assert ("titanic", "train", "Sex") in cols
    assert ("titanic", "train", "Age") in cols
    assert ("titanic", "train", "NormalizedAge") in cols  # predicted, pre-linker


def test_insignificant_statements_dropped(stmts):
    texts = [s.text for s in stmts]
    assert not any(t == "df.head()" for t in texts)


def test_control_flow_types(stmts):
    flows = {s.control_flow for s in stmts}
    assert "import" in flows and "module" in flows


def test_loop_and_conditional_control_flow():
    script = (
        "import pandas as pd\n"
        "df = pd.read_csv('a/b.csv')\n"
        "for i in range(3):\n"
        "    df = df.fillna(i)\n"
        "if True:\n"
        "    df = df.dropna()\n"
    )
    stmts = analyze_script(script)
    flows = {s.text: s.control_flow for s in stmts}
    assert flows["df = df.fillna(i)"] == "loop"
    assert flows["df = df.dropna()"] == "conditional"


def test_method_resolution_through_inferred_types(stmts):
    """df.drop resolves to pandas.DataFrame.drop via doc-inferred type."""
    assert any(s.call == "pandas.DataFrame.drop" for s in stmts)


def test_triples_have_expected_aspects(stmts):
    pdf = statements_to_triples("p1", stmts, {"author": "a", "votes": 1,
                                              "score": 0.5, "task": "clf",
                                              "dataset": "titanic"})
    aspects = set(pdf["aspect"])
    for a in ("code_flow", "data_flow", "control_flow_type", "statement_text",
              "library_calls", "func_parameters", "column_reads",
              "dataset_reads", "rdf_node_types"):
        assert a in aspects, a


def test_code_flow_is_a_chain(stmts):
    pdf = statements_to_triples("p2", stmts)
    next_edges = pdf[pdf["p"] == O.NEXT_STATEMENT]
    assert len(next_edges) == len(stmts) - 1


def test_data_flow_follows_variables(stmts):
    pdf = statements_to_triples("p3", stmts)
    flow = pdf[pdf["p"] == O.DATA_FLOW]
    assert len(flow) >= 5  # df, X, imputer, scaler, clf all flow


def test_library_graph_hierarchy():
    pdf = build_library_graph({"sklearn.ensemble.RandomForestClassifier"})
    subs = pdf[pdf["p"] == O.HAS_SUBMODULE]
    assert len(subs) == 2  # sklearn->ensemble, ensemble->RandomForestClassifier
    assert (pdf["p"] == O.RETURNS_TYPE).any()


def test_syntax_error_script_skipped(spark):
    scripts = spark.createDataFrame(
        pd.DataFrame(
            [
                {"pipeline_id": "bad", "script": "def broken(:", "dataset": "d",
                 "author": "a", "votes": 1, "score": 0.1, "task": "clf"},
                {"pipeline_id": "good", "script": FIGURE3, "dataset": "titanic",
                 "author": "a", "votes": 1, "score": 0.1, "task": "clf"},
            ]
        )[SCRIPTS_COLUMNS]
    )
    store = abstract_corpus(spark, scripts)
    graphs = {r["g"] for r in store.df.select("g").distinct().collect()}
    assert any("good" in g for g in graphs)
    assert not any("bad" in g for g in graphs)


def test_each_pipeline_gets_own_named_graph(spark):
    rows = [
        {"pipeline_id": f"p{i}", "script": FIGURE3, "dataset": "titanic",
         "author": "a", "votes": i, "score": 0.5, "task": "clf"}
        for i in range(3)
    ]
    scripts = spark.createDataFrame(pd.DataFrame(rows)[SCRIPTS_COLUMNS])
    store = abstract_corpus(spark, scripts)
    graphs = {r["g"] for r in store.df.select("g").distinct().collect()}
    pipeline_graphs = {g for g in graphs if "pipelineGraph" in g}
    assert len(pipeline_graphs) == 3
