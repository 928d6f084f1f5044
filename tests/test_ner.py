"""Unit tests for the gazetteer NER substitute (DESIGN.md S1)."""
import pytest

from repro.core import ner


@pytest.mark.parametrize(
    "value,etype",
    [
        ("John", "PERSON"),
        ("john", "PERSON"),
        ("John Smith", "PERSON"),
        ("Canada", "GPE"),
        ("Montreal", "GPE"),
        ("Google", "ORG"),
        ("French", "LANGUAGE"),
        ("iPhone", "PRODUCT"),
    ],
)
def test_recognize_known_entities(value, etype):
    assert ner.recognize(value) == etype


@pytest.mark.parametrize("value", ["qwertyx", "12345", "H3G 1M8", "", "the of and"])
def test_recognize_non_entities(value):
    assert ner.recognize(value) is None


def test_long_values_not_entities():
    assert ner.recognize("john went to canada last june again") is None


def test_entity_ratio():
    assert ner.entity_ratio(["John", "Mary", "zzz", "qqq"]) == 0.5
    assert ner.entity_ratio([]) == 0.0
    assert ner.entity_ratio([None, ""]) == 0.0
    assert ner.entity_ratio(["Canada"] * 10) == 1.0


def test_entity_types_cover_five_categories():
    assert set(ner.ENTITY_TYPES) == {"PERSON", "GPE", "ORG", "LANGUAGE", "PRODUCT"}


def test_majority_token_rule():
    # 1 of 2 tokens in gazetteer -> recognized (majority with ties)
    assert ner.recognize("Canada zzz") == "GPE"
    # 1 of 3 -> not recognized
    assert ner.recognize("Canada zzz qqq") is None
