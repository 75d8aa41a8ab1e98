"""Evaluation measures (paper §V-A, §V-E) on hand-constructed examples."""
import pandas as pd
import pytest

from repro.eval import metrics
from repro.lake.generator import GroundTruth


def _gt():
    gt = GroundTruth()
    gt.base_of = {"t": "b1", "s1": "b1", "s2": "b2"}
    gt.col_origin = {
        ("t", "city"): ("b1", "city", "city"),
        ("t", "name"): ("b1", "name", "practice_entity"),
        ("t", "patients"): ("b1", "patients", "patient_count"),
        ("s1", "town"): ("b1", "city", "city"),
        ("s1", "provider"): ("b1", "name", "practice_entity"),
        ("s2", "city"): ("b2", "city", "city"),
        ("s2", "beds"): ("b2", "beds", "bed_count"),
    }
    return gt


def _align(rows):
    return pd.DataFrame(rows, columns=["query_attr", "attr_id", "q_table", "s_table"])


class TestPrecisionRecall:
    def test_perfect(self):
        p, r = metrics.precision_recall(["a", "b"], {"a", "b"})
        assert (p, r) == (1.0, 1.0)

    def test_half_precision(self):
        p, r = metrics.precision_recall(["a", "x"], {"a", "b"})
        assert p == 0.5 and r == 0.5

    def test_empty_answer(self):
        assert metrics.precision_recall([], {"a"}) == (0.0, 0.0)

    def test_empty_relevant(self):
        p, r = metrics.precision_recall(["a"], set())
        assert p == 0.0 and r == 0.0

    def test_recall_denominator_is_gt(self):
        p, r = metrics.precision_recall(["a"], {"a", "b", "c", "d"})
        assert r == 0.25 and p == 1.0


class TestCoverage:
    def test_eq4_single_table(self):
        a = _align(
            [
                ("t||city", "s1||town", "t", "s1"),
                ("t||name", "s1||provider", "t", "s1"),
            ]
        )
        assert metrics.table_coverage(a, target_arity=3, table="s1") == pytest.approx(2 / 3)

    def test_eq4_no_alignments(self):
        a = _align([])
        assert metrics.table_coverage(a, 3, "s1") == 0.0

    def test_eq4_duplicate_target_attr_counted_once(self):
        a = _align(
            [
                ("t||city", "s1||town", "t", "s1"),
                ("t||city", "s1||provider", "t", "s1"),
            ]
        )
        assert metrics.table_coverage(a, 4, "s1") == 0.25

    def test_eq5_union_over_tables(self):
        a = _align(
            [
                ("t||city", "s1||town", "t", "s1"),
                ("t||name", "s2||city", "t", "s2"),
            ]
        )
        assert metrics.joinpath_coverage(a, 4, {"s1", "s2"}) == 0.5
        assert metrics.joinpath_coverage(a, 4, {"s1"}) == 0.25

    def test_zero_arity(self):
        assert metrics.table_coverage(_align([]), 0, "s1") == 0.0


class TestAttributePrecision:
    def test_all_correct(self):
        a = _align(
            [
                ("t||city", "s1||town", "t", "s1"),
                ("t||name", "s1||provider", "t", "s1"),
            ]
        )
        assert metrics.attribute_precision_table(a, _gt(), "s1") == 1.0

    def test_mixed(self):
        a = _align(
            [
                ("t||city", "s1||town", "t", "s1"),  # TP (city-city)
                ("t||name", "s1||town", "t", "s1"),  # FP (name vs city)
            ]
        )
        assert metrics.attribute_precision_table(a, _gt(), "s1") == 0.5

    def test_none_when_absent(self):
        a = _align([("t||city", "s1||town", "t", "s1")])
        assert metrics.attribute_precision_table(a, _gt(), "s2") is None

    def test_joinpath_group_tp_if_any_related(self):
        a = _align(
            [
                ("t||city", "s1||provider", "t", "s1"),  # wrong
                ("t||city", "s2||city", "t", "s2"),  # right -> group is TP
            ]
        )
        assert metrics.attribute_precision_joinpaths(a, _gt(), {"s1", "s2"}) == 1.0

    def test_joinpath_group_fp_if_none_related(self):
        a = _align(
            [
                ("t||patients", "s1||town", "t", "s1"),
                ("t||patients", "s2||city", "t", "s2"),
            ]
        )
        assert metrics.attribute_precision_joinpaths(a, _gt(), {"s1", "s2"}) == 0.0

    def test_joinpath_mixed_groups(self):
        a = _align(
            [
                ("t||city", "s2||city", "t", "s2"),  # TP group
                ("t||patients", "s2||beds", "t", "s2"),  # FP group
            ]
        )
        assert metrics.attribute_precision_joinpaths(a, _gt(), {"s2"}) == 0.5


class TestMeanOrZero:
    def test_skips_none(self):
        assert metrics.mean_or_zero([1.0, None, 0.0]) == 0.5

    def test_all_none(self):
        assert metrics.mean_or_zero([None, None]) == 0.0

    def test_empty(self):
        assert metrics.mean_or_zero([]) == 0.0
