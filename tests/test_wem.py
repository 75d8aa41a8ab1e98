"""Synthetic word-embedding model: the properties E-relatedness needs."""
import numpy as np
import pytest

from repro.embedding.wem import WordEmbeddingModel

WEM = WordEmbeddingModel()


class TestVectors:
    def test_unit_norm(self):
        for tok in ["street", "manchester", "zzz-oov"]:
            assert np.linalg.norm(WEM.vector(tok)) == pytest.approx(1.0)

    def test_deterministic(self):
        assert np.array_equal(WEM.vector("road"), WEM.vector("road"))

    def test_case_insensitive(self):
        assert np.array_equal(WEM.vector("Road"), WEM.vector("road"))

    def test_dimension(self):
        assert WEM.vector("street").shape == (50,)
        w = WordEmbeddingModel(dim=16)
        assert w.vector("street").shape == (16,)

    def test_same_domain_high_cosine(self):
        pairs = [("street", "road"), ("manchester", "salford"), ("school", "academy")]
        for a, b in pairs:
            cos = float(WEM.vector(a) @ WEM.vector(b))
            assert cos > 0.5, (a, b, cos)

    def test_cross_domain_low_cosine(self):
        pairs = [("street", "manchester"), ("school", "hospital"), ("retail", "burglary")]
        for a, b in pairs:
            cos = float(WEM.vector(a) @ WEM.vector(b))
            assert cos < 0.5, (a, b, cos)

    def test_oov_tokens_uncorrelated(self):
        cos = float(WEM.vector("qqqqq1") @ WEM.vector("qqqqq2"))
        assert abs(cos) < 0.5

    def test_oov_vs_domain_uncorrelated(self):
        cos = float(WEM.vector("qqqqq1") @ WEM.vector("street"))
        assert abs(cos) < 0.5

    def test_seed_changes_space(self):
        w2 = WordEmbeddingModel(seed=99)
        assert not np.allclose(WEM.vector("street"), w2.vector("street"))


class TestDomains:
    def test_domain_of_known(self):
        assert WEM.domain_of("Manchester") == "city"
        assert WEM.domain_of("street") == "street_suffix"

    def test_domain_of_oov(self):
        assert WEM.domain_of("qwertyuiop") is None

    def test_custom_domains(self):
        w = WordEmbeddingModel({"fruit": ["apple", "pear"], "metal": ["iron"]})
        assert w.domain_of("apple") == "fruit"
        assert float(w.vector("apple") @ w.vector("pear")) > 0.5


class TestAggregate:
    def test_empty_tokens_zero_vector(self):
        assert np.allclose(WEM.aggregate([]), 0.0)

    def test_mean_of_single(self):
        assert np.allclose(WEM.aggregate(["street"]), WEM.vector("street"))

    def test_same_domain_aggregates_similar(self):
        a = WEM.aggregate(["street", "road", "avenue"])
        b = WEM.aggregate(["lane", "drive"])
        cos = float(a @ b / (np.linalg.norm(a) * np.linalg.norm(b)))
        assert cos > 0.6

    def test_mixed_domains_weaker(self):
        a = WEM.aggregate(["street", "manchester"])
        b = WEM.aggregate(["school", "retail"])
        cos = float(a @ b / (np.linalg.norm(a) * np.linalg.norm(b)))
        assert cos < 0.6
