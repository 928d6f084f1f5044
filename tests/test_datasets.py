"""Tests for the Table-5/6 evaluation dataset generators (S7)."""
import numpy as np
import pytest

from repro.datasets import cleaning_datasets as cd
from repro.datasets import transformation_datasets as td
from repro.datasets.traits import TRAIT_KINDS, trait_numeric_columns


def test_thirteen_cleaning_specs():
    assert len(cd.SPECS) == 13
    assert [s.id for s in cd.SPECS] == list(range(1, 14))


def test_seventeen_transformation_specs():
    assert len(td.SPECS) == 17
    assert [s.id for s in td.SPECS] == list(range(14, 31))


@pytest.mark.parametrize("spec", cd.SPECS, ids=lambda s: s.name)
def test_cleaning_dataset_has_missing_and_target(spec):
    pdf = cd.build_dataset(spec, 0)
    assert pdf.isna().any().any()
    assert "target" in pdf.columns
    assert pdf["target"].nunique() == spec.n_classes
    assert len(pdf) == spec.rows


def test_mar_on_target_degenerates_dropna():
    spec = next(s for s in cd.SPECS if s.name == "horsecolic")
    pdf = cd.build_dataset(spec, 0)
    remaining = pdf.dropna()
    assert remaining["target"].nunique() <= 1


def test_high_cardinality_flag_raises_domains():
    lo = cd.build_dataset(next(s for s in cd.SPECS if s.name == "adult"), 0)
    hi = cd.build_dataset(next(s for s in cd.SPECS if s.name == "higgs"), 0)
    assert hi["f2"].nunique() > 10 * lo["f2"].nunique()


@pytest.mark.parametrize("spec", td.SPECS, ids=lambda s: s.name)
def test_transformation_dataset_shape(spec):
    pdf, truth = td.build_dataset(spec, 0)
    assert len(pdf) == spec.rows
    assert set(truth.values()) <= {"log", "sqrt", "none"}
    assert pdf["target"].nunique() == spec.n_classes
    assert not pdf.isna().any().any()


def test_transformation_scales_differ_wildly():
    pdf, _ = td.build_dataset(td.SPECS[0], 0)
    mags = [pdf[c].abs().mean() for c in pdf.columns if c != "target"]
    assert max(mags) / (min(mags) + 1e-12) > 100


@pytest.mark.parametrize("kind", TRAIT_KINDS)
def test_trait_columns_generate(kind):
    rng = np.random.default_rng(0)
    cols = trait_numeric_columns(rng, kind, 100, 4)
    assert len(cols) == 4
    assert all(len(v) == 100 for v in cols.values())


def test_smooth_trait_is_near_arithmetic():
    rng = np.random.default_rng(1)
    cols = trait_numeric_columns(rng, "smooth", 200, 2)
    diffs = np.diff(cols["f0"])
    assert diffs.std() < 0.2 * abs(diffs.mean())


def test_plain_trait_zero_inflated():
    rng = np.random.default_rng(2)
    cols = trait_numeric_columns(rng, "plain", 500, 2)
    assert (cols["f0"] == 0).mean() > 0.4


def test_correlated_trait_actually_correlates():
    rng = np.random.default_rng(3)
    cols = trait_numeric_columns(rng, "correlated", 300, 3)
    assert np.corrcoef(cols["f0"], cols["f1"])[0, 1] > 0.95


def test_determinism():
    a = cd.build_dataset(cd.SPECS[0], 7)
    b = cd.build_dataset(cd.SPECS[0], 7)
    assert a.equals(b)
    ta, _ = td.build_dataset(td.SPECS[0], 7)
    tb, _ = td.build_dataset(td.SPECS[0], 7)
    assert ta.equals(tb)
