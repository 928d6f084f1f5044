"""Tests for union search, join-path discovery and the two baselines."""
import pytest

from repro.baselines import santos_like, starmie_like
from repro.discovery import join_discovery, metrics
from repro.discovery import union_search as us
from repro.lakegen.lake import LakeConfig, build_lake


@pytest.fixture(scope="module")
def lake():
    return build_lake(
        LakeConfig(name="disc", n_groups=5, members_per_group=4, rows=100,
                   n_query=4, k=3, seed=11)
    )


@pytest.fixture(scope="module")
def index(spark, lake):
    return us.build_index(spark, lake)


def test_metrics_precision_recall():
    ranked = ["a", "b", "c", "d"]
    truth = {"a", "c", "x"}
    assert metrics.precision_at_k(ranked, truth, 2) == 0.5
    assert metrics.recall_at_k(ranked, truth, 4) == pytest.approx(2 / 3)
    assert metrics.precision_at_k([], truth, 3) == 0.0
    assert metrics.recall_at_k(ranked, set(), 3) == 0.0


def test_union_search_finds_group_members(lake, index):
    q = lake.query_tables[0]
    truth = lake.unionable_with(q)
    top = [t for t, _ in index.query(q, k=3)]
    assert len(set(top) & truth) >= 2


def test_union_search_accuracy(lake, index):
    results, _ = us.evaluate(index, lake)
    truths = {q: lake.unionable_with(q) for q in lake.query_tables}
    p, r = metrics.average_pr_at_k(results, truths, lake.k)
    assert p > 0.7 and r > 0.7


def test_union_query_is_sub_millisecond(lake, index):
    _, avg_s = us.evaluate(index, lake)
    assert avg_s < 0.05  # pre-materialized edges -> index lookups


def test_query_unknown_table_empty(index):
    assert index.query("nope") == []


def test_join_paths_direct_and_two_hop(lake, index):
    q = lake.query_tables[0]
    member = sorted(lake.unionable_with(q))[0]
    paths = join_discovery.find_join_paths(index, q, member, hops=2)
    assert paths and all(p[0] == q and p[-1] == member for p in paths)
    frame = join_discovery.join_paths_frame(paths)
    assert set(frame.columns) == {"hops", "path"}
    assert (frame["hops"] >= 1).all()


def test_shortest_join_path(lake, index):
    q = lake.query_tables[0]
    member = sorted(lake.unionable_with(q))[0]
    shortest = join_discovery.shortest_join_path(index, q, member)
    assert shortest is not None
    assert len(shortest) == 2  # directly joinable group members


def test_no_join_path_returns_none(index):
    assert join_discovery.shortest_join_path(index, "ghost1", "ghost2") is None


def test_starmie_like_accuracy(lake):
    idx = starmie_like.build_index(lake, epochs=2)
    results, _ = starmie_like.evaluate(idx, lake)
    truths = {q: lake.unionable_with(q) for q in lake.query_tables}
    p, r = metrics.average_pr_at_k(results, truths, lake.k)
    assert p > 0.5


def test_starmie_preprocessing_slower_than_embedding_free_lookup(lake):
    idx = starmie_like.build_index(lake, epochs=2)
    assert idx.preprocessing_s > 0
    assert idx.embeddings.shape[1] == starmie_like.DIM


def test_santos_like_accuracy(lake):
    idx = santos_like.build_index(lake)
    results, _ = santos_like.evaluate(idx, lake)
    truths = {q: lake.unionable_with(q) for q in lake.query_tables}
    p, r = metrics.average_pr_at_k(results, truths, lake.k)
    assert p > 0.3  # SANTOS is the weakest on D3L-style lakes (paper)


def test_santos_queries_are_value_granular_and_slow(lake):
    idx = santos_like.build_index(lake)
    _, avg_s = santos_like.evaluate(idx, lake)
    kg_avg = 0.001  # KGLiDS queries are ~ms (asserted above)
    assert avg_s > kg_avg  # value-granularity matching costs more
