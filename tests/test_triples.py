"""Tests for the Spark triple store and BGP query engine (sub. S4)."""
import math

import pytest

from repro.core import ontology as O
from repro.core.triples import DEFAULT_GRAPH, TripleBuilder, TripleStore
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def store(spark):
    tb = TripleBuilder(graph="g1")
    tb.add("a", O.RDF_TYPE, O.TABLE)
    tb.add("b", O.RDF_TYPE, O.TABLE)
    tb.add("c1", O.IS_PART_OF, "a")
    tb.add("c2", O.IS_PART_OF, "a")
    tb.add("c3", O.IS_PART_OF, "b")
    tb.add("c1", O.CONTENT_SIMILARITY, "c3", w=0.97)
    tb.add("c1", O.RDF_TYPE, O.COLUMN)
    tb.add("c2", O.RDF_TYPE, O.COLUMN)
    tb.add("c3", O.RDF_TYPE, O.COLUMN)
    return TripleStore.from_pandas(spark, tb.to_pandas()).persist()


def test_counts(store):
    assert store.n_triples() == 9
    assert store.n_unique_predicates() == 3
    # nodes: a, b, c1, c2, c3, Table, Column
    assert store.n_unique_nodes() == 7


def test_match_single_pattern(store):
    rows = store.match(p=O.RDF_TYPE, o=O.TABLE).collect()
    assert {r["s"] for r in rows} == {"a", "b"}


def test_match_with_graph(store):
    assert store.match(g="g1").count() == 9
    assert store.match(g="nope").count() == 0


def test_rdf_star_weight(store):
    row = store.match(p=O.CONTENT_SIMILARITY).collect()[0]
    assert row["w"] == pytest.approx(0.97)


def test_unannotated_weight_is_null(store):
    row = store.match(s="a", p=O.RDF_TYPE).collect()[0]
    assert row["w"] is None or math.isnan(row["w"])


def test_bgp_join(store):
    # columns of tables: ?c isPartOf ?t . ?t rdf:type Table
    df = store.match_bgp(
        [("?c", O.IS_PART_OF, "?t"), ("?t", O.RDF_TYPE, O.TABLE)]
    )
    got = {(r["c"], r["t"]) for r in df.collect()}
    assert got == {("c1", "a"), ("c2", "a"), ("c3", "b")}


def test_bgp_with_similarity_chain(store):
    df = store.match_bgp(
        [
            ("?c", O.CONTENT_SIMILARITY, "?d"),
            ("?c", O.IS_PART_OF, "?t1"),
            ("?d", O.IS_PART_OF, "?t2"),
        ]
    )
    rows = df.collect()
    assert len(rows) == 1
    assert (rows[0]["t1"], rows[0]["t2"]) == ("a", "b")


def test_bgp_empty_raises(store):
    with pytest.raises(ValueError):
        store.match_bgp([])


def test_bgp_matches_duckdb_oracle(spark, store):
    """The BGP join result must equal the equivalent SQL self-join."""
    triples_pdf = store.df.toPandas()[["s", "p", "o"]]
    got = store.match_bgp(
        [("?c", O.IS_PART_OF, "?t"), ("?t", O.RDF_TYPE, O.TABLE)]
    ).select("c", "t")
    sql = f"""
        SELECT t1.s AS c, t1.o AS t
        FROM triples t1 JOIN triples t2 ON t1.o = t2.s
        WHERE t1.p = '{O.IS_PART_OF}' AND t2.p = '{O.RDF_TYPE}'
          AND t2.o = '{O.TABLE}'
    """
    assert_equivalent(got, sql, triples=triples_pdf)


def test_aspect_breakdown_matches_oracle(spark, store):
    pdf = store.aspect_breakdown()
    assert pdf["pct"].sum() == pytest.approx(100.0)
    got = spark.createDataFrame(pdf[["aspect", "n_triples"]])
    sql = "SELECT aspect, COUNT(*) AS n_triples FROM triples GROUP BY aspect"
    assert_equivalent(got, sql, triples=store.df.toPandas())


def test_union_and_empty(spark, store):
    empty = TripleStore.empty(spark)
    assert empty.n_triples() == 0
    assert empty.union(store).n_triples() == 9


def test_ntriples_size_positive(store):
    assert store.ntriples_size_bytes() > 100


def test_builder_default_graph():
    tb = TripleBuilder()
    tb.add("s", "p", "o")
    assert tb.to_pandas()["g"].iloc[0] == DEFAULT_GRAPH


def test_from_rows(spark):
    ts = TripleStore.from_rows(
        spark, [("g", "s", "p", "o", 0.5, "other")]
    )
    assert ts.n_triples() == 1
