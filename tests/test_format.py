"""Format-string extraction (paper §III-B get_regex_string)."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.features import format_of


class TestPrimitives:
    @pytest.mark.parametrize(
        "value,expected",
        [
            ("Portland", "C"),
            ("BT7", "A"),
            ("HELLO", "U"),
            ("hello", "L"),
            ("1234", "N"),
            ("a1b2", "A"),
            (",", "P"),
            ("!!", "P"),
        ],
    )
    def test_single_token(self, value, expected):
        assert format_of(value) == expected

    def test_paper_example(self):
        # '18 Portland Street, M1 3BE' -> N C C P A A -> NC+PA+
        assert format_of("18 Portland Street, M1 3BE") == "NC+PA+"

    def test_postcode(self):
        assert format_of("M13 9PL") == "A+"

    def test_date(self):
        assert format_of("2019-03-04") == "NPNPN"

    def test_email(self):
        assert format_of("alice.smith@mail.co.uk") == "LPLPLPLPL"

    def test_phone(self):
        assert format_of("0161 234 5678") == "N+"

    def test_time_range(self):
        assert format_of("08:00-18:00") == "NPNPNPN"


class TestRunCompression:
    def test_consecutive_same_class_collapse(self):
        assert format_of("Oxford Road") == "C+"

    def test_alternation_not_collapsed(self):
        assert format_of("a1 b2") == "A+"  # both alnum-mixed tokens
        assert format_of("ab 12 cd") == "LNL"

    def test_first_match_order(self):
        # 'Abc' matches C before U/A.
        assert format_of("Abc") == "C"
        # 'ABC' fails C (no lowercase) and matches U.
        assert format_of("ABC") == "U"


class TestEdgeCases:
    def test_empty_string(self):
        assert format_of("") == ""

    def test_whitespace_only(self):
        assert format_of("   ") == ""

    def test_mixed_punct_run(self):
        assert format_of("a -- b") == "LPL"

    def test_unicode_goes_to_punct(self):
        assert "P" in format_of("café£")

    @given(st.text(max_size=60))
    @settings(max_examples=80, deadline=None)
    def test_total_function_and_alphabet(self, s):
        out = format_of(s)
        stripped = out.replace("+", "")
        assert set(stripped) <= set("CULNAP")

    @given(st.text(max_size=60))
    @settings(max_examples=50, deadline=None)
    def test_no_adjacent_duplicate_symbols(self, s):
        out = format_of(s)
        symbols = []
        i = 0
        while i < len(out):
            sym = out[i]
            plus = i + 1 < len(out) and out[i + 1] == "+"
            symbols.append(sym)
            i += 2 if plus else 1
        for a, b in zip(symbols, symbols[1:]):
            assert a != b

    def test_same_format_different_values(self):
        assert format_of("M1 3BE") == format_of("BT7 1JL")

    def test_abbreviated_street_keeps_class(self):
        # 'Oxford Rd' and 'Oxford Road' share their format — the dirtiness
        # robustness the paper attributes to F-evidence.
        assert format_of("41 Oxford Rd") == format_of("41 Oxford Road")
