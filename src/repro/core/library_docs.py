"""Programming-library documentation KB — the LD input of Algorithm 1.

The paper parses real library documentation into JSON documents holding,
for each class/method: parameter names (with defaults) and return data
types. We hand-build that KB for the pandas / sklearn / xgboost / numpy
surface used by data-science pipelines (and by our synthetic corpus).
Each entry: ``{"params": [(name, default_or_None), ...], "returns": str}``.

The KB also induces the *library graph* (paper Fig. 2, red): library ->
subpackage -> class/function membership edges plus return types.
"""
from __future__ import annotations

from typing import Any

# fully-qualified callable -> {"params": [(name, default)], "returns": type}
LIBRARY_DOCS: dict[str, dict[str, Any]] = {
    "pandas.read_csv": {
        "params": [("filepath_or_buffer", None), ("sep", ","), ("header", "infer")],
        "returns": "pandas.DataFrame",
    },
    "pandas.DataFrame.drop": {
        "params": [("labels", None), ("axis", 0), ("inplace", False)],
        "returns": "pandas.DataFrame",
    },
    "pandas.DataFrame.fillna": {
        "params": [("value", None), ("method", None), ("axis", None)],
        "returns": "pandas.DataFrame",
    },
    "pandas.DataFrame.interpolate": {
        "params": [("method", "linear"), ("axis", 0)],
        "returns": "pandas.DataFrame",
    },
    "pandas.DataFrame.dropna": {
        "params": [("axis", 0), ("how", "any")],
        "returns": "pandas.DataFrame",
    },
    "pandas.DataFrame.head": {"params": [("n", 5)], "returns": "pandas.DataFrame"},
    "pandas.DataFrame.describe": {"params": [], "returns": "pandas.DataFrame"},
    "pandas.get_dummies": {
        "params": [("data", None), ("columns", None)],
        "returns": "pandas.DataFrame",
    },
    "sklearn.impute.SimpleImputer": {
        "params": [("missing_values", "nan"), ("strategy", "mean")],
        "returns": "sklearn.impute.SimpleImputer",
    },
    "sklearn.impute.KNNImputer": {
        "params": [("missing_values", "nan"), ("n_neighbors", 5)],
        "returns": "sklearn.impute.KNNImputer",
    },
    "sklearn.impute.IterativeImputer": {
        "params": [("estimator", None), ("max_iter", 10)],
        "returns": "sklearn.impute.IterativeImputer",
    },
    "sklearn.preprocessing.StandardScaler": {
        "params": [("copy", True), ("with_mean", True), ("with_std", True)],
        "returns": "sklearn.preprocessing.StandardScaler",
    },
    "sklearn.preprocessing.MinMaxScaler": {
        "params": [("feature_range", "(0, 1)")],
        "returns": "sklearn.preprocessing.MinMaxScaler",
    },
    "sklearn.preprocessing.RobustScaler": {
        "params": [("with_centering", True), ("with_scaling", True)],
        "returns": "sklearn.preprocessing.RobustScaler",
    },
    "sklearn.preprocessing.LabelEncoder": {
        "params": [],
        "returns": "sklearn.preprocessing.LabelEncoder",
    },
    "sklearn.preprocessing.OneHotEncoder": {
        "params": [("categories", "auto"), ("handle_unknown", "error")],
        "returns": "sklearn.preprocessing.OneHotEncoder",
    },
    "sklearn.ensemble.RandomForestClassifier": {
        "params": [
            ("n_estimators", 100), ("criterion", "gini"), ("max_depth", None),
            ("min_samples_split", 2), ("random_state", None),
        ],
        "returns": "sklearn.ensemble.RandomForestClassifier",
    },
    "sklearn.ensemble.GradientBoostingClassifier": {
        "params": [("n_estimators", 100), ("learning_rate", 0.1), ("max_depth", 3)],
        "returns": "sklearn.ensemble.GradientBoostingClassifier",
    },
    "sklearn.linear_model.LogisticRegression": {
        "params": [("penalty", "l2"), ("C", 1.0), ("max_iter", 100)],
        "returns": "sklearn.linear_model.LogisticRegression",
    },
    "sklearn.svm.SVC": {
        "params": [("C", 1.0), ("kernel", "rbf"), ("gamma", "scale")],
        "returns": "sklearn.svm.SVC",
    },
    "sklearn.neighbors.KNeighborsClassifier": {
        "params": [("n_neighbors", 5), ("weights", "uniform")],
        "returns": "sklearn.neighbors.KNeighborsClassifier",
    },
    "sklearn.tree.DecisionTreeClassifier": {
        "params": [("criterion", "gini"), ("max_depth", None)],
        "returns": "sklearn.tree.DecisionTreeClassifier",
    },
    "sklearn.model_selection.train_test_split": {
        "params": [("X", None), ("y", None), ("test_size", 0.25),
                   ("random_state", None)],
        "returns": "tuple",
    },
    "sklearn.metrics.accuracy_score": {
        "params": [("y_true", None), ("y_pred", None)],
        "returns": "float",
    },
    "sklearn.metrics.f1_score": {
        "params": [("y_true", None), ("y_pred", None), ("average", "binary")],
        "returns": "float",
    },
    "xgboost.XGBClassifier": {
        "params": [("n_estimators", 100), ("max_depth", 6), ("learning_rate", 0.3)],
        "returns": "xgboost.XGBClassifier",
    },
    "numpy.log": {"params": [("x", None)], "returns": "numpy.ndarray"},
    "numpy.sqrt": {"params": [("x", None)], "returns": "numpy.ndarray"},
}

# methods that exist on objects whose type we inferred from docs, e.g.
# fit/transform on any sklearn estimator, keyed by method name.
COMMON_METHODS: dict[str, dict[str, Any]] = {
    "fit": {"params": [("X", None), ("y", None)], "returns": "self"},
    "transform": {"params": [("X", None)], "returns": "numpy.ndarray"},
    "fit_transform": {"params": [("X", None), ("y", None)], "returns": "numpy.ndarray"},
    "predict": {"params": [("X", None)], "returns": "numpy.ndarray"},
}

# Statements with no pipeline-semantic significance (paper §3.1).
INSIGNIFICANT_CALLS = {"print", "head", "summary", "describe", "info", "display"}


def lookup(qualified_name: str) -> dict[str, Any] | None:
    """Find doc entry for a fully-qualified call, or a common method."""
    if qualified_name in LIBRARY_DOCS:
        return LIBRARY_DOCS[qualified_name]
    tail = qualified_name.rsplit(".", 1)[-1]
    return COMMON_METHODS.get(tail)


def library_of(qualified_name: str) -> str:
    return qualified_name.split(".", 1)[0]


def hierarchy_edges() -> list[tuple[str, str]]:
    """(parent, child) membership edges of the library graph."""
    edges = set()
    for name in LIBRARY_DOCS:
        parts = name.split(".")
        for i in range(1, len(parts)):
            edges.add((".".join(parts[:i]), ".".join(parts[: i + 1])))
    return sorted(edges)
