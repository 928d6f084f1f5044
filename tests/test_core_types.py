"""Unit tests for the fine-grained type system and table embeddings."""
import numpy as np
import pytest

from repro.core.types import (
    ALL_TYPES,
    EMBEDDED_TYPES,
    EMBEDDING_DIM,
    TABLE_EMBEDDING_DIM,
    ColumnProfile,
    FineGrainedType,
    table_embedding,
)


def _profile(fgt, emb=None):
    return ColumnProfile(
        dataset="d", table="t", column="c", fgt=fgt, n_rows=10, n_nulls=0,
        n_distinct=10, true_ratio=float("nan"), mean=0.0, std=1.0,
        embedding=emb if emb is not None else np.ones(EMBEDDING_DIM),
        label_embedding=np.zeros(100),
    )


def test_seven_types():
    assert len(ALL_TYPES) == 7


def test_embedded_types_excludes_boolean():
    assert FineGrainedType.BOOLEAN not in EMBEDDED_TYPES
    assert len(EMBEDDED_TYPES) == 6


def test_table_embedding_dim_is_1800():
    assert TABLE_EMBEDDING_DIM == 1800
    emb = table_embedding([_profile(FineGrainedType.INT)])
    assert emb.shape == (1800,)


def test_table_embedding_zero_blocks_for_absent_types():
    emb = table_embedding([_profile(FineGrainedType.INT)])
    # int is the first block; everything else must be zero
    assert np.all(emb[:EMBEDDING_DIM] == 1.0)
    assert np.all(emb[EMBEDDING_DIM:] == 0.0)


@pytest.mark.parametrize("fgt", EMBEDDED_TYPES)
def test_table_embedding_block_position(fgt):
    emb = table_embedding([_profile(fgt)])
    i = EMBEDDED_TYPES.index(fgt)
    block = emb[i * EMBEDDING_DIM : (i + 1) * EMBEDDING_DIM]
    assert np.all(block == 1.0)
    assert emb.sum() == EMBEDDING_DIM


def test_table_embedding_averages_same_type():
    p1 = _profile(FineGrainedType.FLOAT, emb=np.full(EMBEDDING_DIM, 2.0))
    p2 = _profile(FineGrainedType.FLOAT, emb=np.full(EMBEDDING_DIM, 4.0))
    emb = table_embedding([p1, p2])
    i = EMBEDDED_TYPES.index(FineGrainedType.FLOAT)
    assert np.allclose(emb[i * EMBEDDING_DIM : (i + 1) * EMBEDDING_DIM], 3.0)


def test_column_id():
    assert _profile(FineGrainedType.INT).column_id() == "d/t/c"
