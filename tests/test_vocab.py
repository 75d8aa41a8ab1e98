"""Vocabulary pools and value generators (lake substrate)."""
import re

import numpy as np
import pytest

from repro.lake import vocab


def rng():
    return np.random.default_rng(0)


class TestPools:
    def test_domains_non_empty(self):
        for name, words in vocab.DOMAINS.items():
            assert len(words) > 0, name

    def test_no_empty_words(self):
        for words in vocab.DOMAINS.values():
            assert all(w.strip() for w in words)

    def test_abbrev_map_covers_suffixes(self):
        assert set(vocab.STREET_SUFFIX_ABBREV) == set(vocab.STREET_SUFFIXES)


class TestGenerators:
    def test_postcode_format(self):
        for _ in range(50):
            pc = vocab.postcode(rng())
            assert re.fullmatch(r"[A-Z]{1,2}\d{1,2} \d[A-Z]{2}", pc), pc

    def test_street_format(self):
        s = vocab.street(rng())
        assert re.fullmatch(r"\d+ \w+ \w+", s), s
        assert s.split()[-1] in vocab.STREET_SUFFIXES

    def test_city_from_pool(self):
        assert vocab.city(rng()) in vocab.CITIES

    def test_practice_name_patterns(self):
        g = np.random.default_rng(2)
        names = {vocab.practice_name(g) for _ in range(50)}
        assert any(n.startswith("Dr ") for n in names)
        assert any(not n.startswith("Dr ") for n in names)

    def test_email_contains_owner_slug(self):
        e = vocab.email(rng(), "Smith Holdings")
        assert e.startswith("smith.holdings@")
        assert "@" in e

    def test_phone_format(self):
        assert re.fullmatch(r"0\d{3} \d{3} \d{4}", vocab.phone(rng()))

    def test_date_format(self):
        assert re.fullmatch(r"\d{4}-\d{2}-\d{2}", vocab.date_str(rng()))

    def test_month_format(self):
        assert re.fullmatch(r"\d{4}-\d{2}", vocab.month_str(rng()))

    def test_deterministic_in_rng(self):
        a = [vocab.postcode(np.random.default_rng(7)) for _ in range(3)]
        b = [vocab.postcode(np.random.default_rng(7)) for _ in range(3)]
        assert a == b

    @pytest.mark.parametrize(
        "fn",
        [vocab.school_name, vocab.hospital_name, vocab.company_name, vocab.person_name],
    )
    def test_entity_names_two_plus_words(self, fn):
        assert len(fn(rng()).split()) >= 2
