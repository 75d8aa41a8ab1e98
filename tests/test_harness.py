"""Experiment harness plumbing (shared by jobs and benchmarks)."""
import pytest

from repro.core.ranking import SearchResult
from repro.eval import harness


class TestRepoBuilding:
    def test_presets_exist(self):
        assert {"synthetic", "real", "larger"} <= set(harness.REPO_PRESETS)

    def test_build_repo(self, spark):
        repo = harness.build_repo(spark, "synthetic", derivations_per_base=2, rows=30)
        assert repo.lake.n_tables == 24
        assert repo.cells.count() > 0
        repo.cells.unpersist()

    def test_synthetic_preset_clean(self):
        assert harness.REPO_PRESETS["synthetic"]["noise"] == 0.0

    def test_real_preset_dirty(self):
        assert harness.REPO_PRESETS["real"]["noise"] > 0.0


class TestTargets:
    def test_pick_targets_deterministic(self, clean_lake):
        a = harness.pick_targets(clean_lake, 5, seed=1)
        b = harness.pick_targets(clean_lake, 5, seed=1)
        assert a == b

    def test_pick_targets_have_gt(self, clean_lake):
        for t in harness.pick_targets(clean_lake, 8):
            assert clean_lake.gt.related_tables(t)

    def test_pick_targets_capped(self, clean_lake):
        assert len(harness.pick_targets(clean_lake, 10_000)) <= clean_lake.n_tables


class TestPrAtKs:
    def test_truncation_semantics(self, clean_lake):
        target = "crimes__000"
        rel = sorted(clean_lake.gt.related_tables(target))
        res = {
            target: SearchResult(
                target=target,
                ranking=[(rel[0], 0.1), ("schools__000", 0.2), (rel[1], 0.3)],
                alignments=None,
            )
        }
        rows = {r["k"]: r for r in harness.pr_at_ks(res, clean_lake, [1, 3])}
        assert rows[1]["precision"] == 1.0
        assert rows[3]["precision"] == pytest.approx(2 / 3)
        assert rows[3]["recall"] == 1.0

    def test_k_rows_ordered(self, clean_lake):
        res = {
            "crimes__000": SearchResult(
                target="crimes__000", ranking=[], alignments=None
            )
        }
        rows = harness.pr_at_ks(res, clean_lake, [1, 2, 3])
        assert [r["k"] for r in rows] == [1, 2, 3]


class TestEndToEnd:
    def test_individual_effectiveness_rows(self, d3l_clean, clean_lake):
        targets = harness.pick_targets(clean_lake, 3)
        rows = harness.run_individual_effectiveness(
            d3l_clean, clean_lake, targets, ks=[2, 5]
        )
        labels = {r["evidence"] for r in rows}
        assert labels == {"n", "v", "f", "e", "combined"}
        assert len(rows) == 5 * 2
        for r in rows:
            assert 0.0 <= r["precision"] <= 1.0
            assert 0.0 <= r["recall"] <= 1.0

    def test_comparative_effectiveness_rows(self, d3l_clean, clean_lake):
        targets = harness.pick_targets(clean_lake, 3)
        rows = harness.run_comparative_effectiveness(
            {"d3l": d3l_clean}, clean_lake, targets, ks=[2]
        )
        assert len(rows) == 1 and rows[0]["system"] == "d3l"

    def test_time_search_rows(self, d3l_clean, clean_lake):
        targets = harness.pick_targets(clean_lake, 1)
        rows = harness.time_search(d3l_clean, targets, ks=[2])
        assert rows[0]["seconds"] > 0.0
