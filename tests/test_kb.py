"""Synthetic knowledge base (YAGO stand-in for TUS)."""
import pytest

from repro.baselines.kb import HYPERNYMS, KnowledgeBase

KB = KnowledgeBase()


class TestTokenClasses:
    def test_city_chain(self):
        chain = KB.classes_of_token("manchester")
        assert chain[0] == "city"
        assert chain[-1] == "entity"
        assert "settlement" in chain and "location" in chain

    def test_case_insensitive(self):
        assert KB.classes_of_token("Manchester") == KB.classes_of_token("manchester")

    def test_oov_empty(self):
        assert KB.classes_of_token("zzzzzz") == ()

    def test_every_chain_ends_at_entity(self):
        for tok in ["street", "school", "burglary", "NO2", "cardiology"]:
            chain = KB.classes_of_token(tok)
            assert chain and chain[-1] == "entity", tok

    def test_hypernyms_cover_known_domains(self):
        for dom in HYPERNYMS:
            assert len(HYPERNYMS[dom]) >= 1


class TestValueClasses:
    def test_value_union(self):
        classes = KB.classes_of_value("41 Oxford Road")
        assert "street" in classes and "location" in classes

    def test_value_with_only_oov(self):
        assert KB.classes_of_value("qqq zzz 123") == set()

    def test_same_domain_values_share_classes(self):
        a = KB.classes_of_value("Manchester")
        b = KB.classes_of_value("Salford")
        assert a & b

    def test_cross_domain_values_share_little(self):
        a = KB.classes_of_value("Manchester")
        b = KB.classes_of_value("burglary")
        assert "entity" in (a & b)
        assert len(a & b) == 1  # only the shared root

    def test_punctuation_split(self):
        classes = KB.classes_of_value("Manchester,Salford")
        assert "city" in classes

    def test_custom_domains(self):
        kb = KnowledgeBase({"fruit": ["apple"]})
        assert kb.classes_of_token("apple") == ("fruit", "entity")
