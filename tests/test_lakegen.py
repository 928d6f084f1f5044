"""Tests for the synthetic data-lake generators (substitution S5)."""
import numpy as np
import pandas as pd
import pytest

from repro.core import ner
from repro.core.type_inference import infer_fine_grained_type
from repro.core.types import FineGrainedType as F
from repro.lakegen import generators as G
from repro.lakegen.benchmarks import CONFIGS, PAPER_TABLE1, build_benchmark
from repro.lakegen.lake import LakeConfig, build_lake


@pytest.fixture(scope="module")
def small_lake():
    return build_lake(
        LakeConfig(name="mini", n_groups=4, members_per_group=3, rows=60,
                   n_query=3, k=2, seed=9)
    )


def test_lake_shape(small_lake):
    assert len(small_lake.tables) == 12
    assert all(len(t) > 0 for t in small_lake.tables.values())
    assert len(small_lake.query_tables) == 3


def test_ground_truth_groups(small_lake):
    q = small_lake.query_tables[0]
    others = small_lake.unionable_with(q)
    assert len(others) == 2
    assert q not in others


def test_determinism():
    cfg = LakeConfig(name="d", n_groups=2, members_per_group=2, rows=30,
                     n_query=1, k=1, seed=5)
    a, b = build_lake(cfg), build_lake(cfg)
    assert sorted(a.tables) == sorted(b.tables)
    for t in a.tables:
        pd.testing.assert_frame_equal(a.tables[t], b.tables[t])


def test_members_share_concepts_with_synonyms(small_lake):
    """Tables of one group overlap in concepts even when renamed."""
    gid = small_lake.group_of[small_lake.query_tables[0]]
    members = [t for t, g in small_lake.group_of.items() if g == gid]
    col_sets = [set(small_lake.tables[m].columns) for m in members]
    # at least the mandatory first concept always survives partitioning
    assert all(len(c) >= 3 for c in col_sets)


def test_hard_mode_rescales_floats():
    base = LakeConfig(name="x", n_groups=1, members_per_group=4, rows=50,
                      n_query=1, k=1, seed=3, hard=False)
    hard = LakeConfig(name="x", n_groups=1, members_per_group=4, rows=50,
                      n_query=1, k=1, seed=3, hard=True)
    a, b = build_lake(base), build_lake(hard)
    assert sorted(a.tables) == sorted(b.tables)


@pytest.mark.parametrize("name", list(CONFIGS))
def test_benchmark_configs_match_paper_protocol(name):
    cfg = CONFIGS[name]
    paper = PAPER_TABLE1[name]
    # relative ordering of corpus sizes is preserved at lite scale
    assert cfg.n_groups * cfg.members_per_group >= 50
    assert paper["n_tables"] > cfg.n_groups * cfg.members_per_group


def test_santos_large_is_largest():
    sizes = {n: c.n_groups * c.members_per_group for n, c in CONFIGS.items()}
    assert max(sizes, key=sizes.get) == "santos_large"


def test_generated_types_are_inferred_correctly():
    rng = np.random.default_rng(0)
    assert infer_fine_grained_type(G.int_values(rng, 200)) is F.INT
    assert infer_fine_grained_type(G.float_values(rng, 200)) is F.FLOAT
    assert infer_fine_grained_type(G.bool_values(rng, 200)) is F.BOOLEAN
    assert infer_fine_grained_type(G.date_values(rng, 200)) is F.DATE
    assert (
        infer_fine_grained_type(G.named_entity_values(rng, 200)) is F.NAMED_ENTITY
    )
    assert (
        infer_fine_grained_type(G.natural_language_values(rng, 200))
        is F.NATURAL_LANGUAGE
    )
    assert infer_fine_grained_type(G.string_values(rng, 200)) is F.STRING


def test_ne_values_covered_by_gazetteers():
    rng = np.random.default_rng(1)
    vals = G.named_entity_values(rng, 100, etype="GPE")
    assert ner.entity_ratio(vals) > 0.9


def test_tus_smoke_build():
    lake = build_benchmark("tus_small")
    cfg = CONFIGS["tus_small"]
    assert len(lake.tables) == cfg.n_groups * cfg.members_per_group
    assert len(lake.query_tables) == cfg.n_query
