"""Synthetic lake generator: derivation procedure and ground truth."""
import numpy as np
import pandas as pd
import pytest

from repro.lake import generator
from repro.lake.generator import BASE_SPECS, generate_lake


@pytest.fixture(scope="module")
def lake():
    return generate_lake(derivations_per_base=3, rows=50, noise=0.0, seed=42)


@pytest.fixture(scope="module")
def dirty():
    return generate_lake(derivations_per_base=3, rows=50, noise=0.9, seed=42)


class TestStructure:
    def test_table_count(self, lake):
        assert lake.n_tables == len(BASE_SPECS) * 3

    def test_every_table_nonempty(self, lake):
        for name, df in lake.tables.items():
            assert len(df) >= 5, name
            assert df.shape[1] >= 2, name

    def test_deterministic(self):
        l1 = generate_lake(derivations_per_base=2, rows=30, noise=0.4, seed=9)
        l2 = generate_lake(derivations_per_base=2, rows=30, noise=0.4, seed=9)
        assert sorted(l1.tables) == sorted(l2.tables)
        for t in l1.tables:
            pd.testing.assert_frame_equal(l1.tables[t], l2.tables[t])

    def test_seed_changes_content(self):
        l1 = generate_lake(derivations_per_base=2, rows=30, seed=1)
        l2 = generate_lake(derivations_per_base=2, rows=30, seed=2)
        diffs = sum(
            not l1.tables[t].equals(l2.tables[t])
            for t in l1.tables
            if t in l2.tables and l1.tables[t].shape == l2.tables[t].shape
        )
        assert diffs > 0 or any(
            l1.tables[t].shape != l2.tables[t].shape for t in l1.tables
        )

    def test_bases_filter(self):
        l = generate_lake(derivations_per_base=2, rows=30, bases=["crimes", "schools"])
        assert {l.gt.base_of[t] for t in l.tables} == {"crimes", "schools"}

    def test_rejects_bad_noise(self):
        with pytest.raises(ValueError):
            generate_lake(noise=1.5)

    def test_clean_lake_keeps_base_column_names(self, lake):
        base_cols = {c.name for cols in BASE_SPECS.values() for c in cols}
        for name, df in lake.tables.items():
            assert set(df.columns) <= base_cols, name

    def test_clean_lake_has_no_nulls(self, lake):
        for name, df in lake.tables.items():
            assert not df.isna().any().any(), name


class TestGroundTruth:
    def test_base_of_every_table(self, lake):
        assert set(lake.gt.base_of) == set(lake.tables)

    def test_related_tables_same_base(self, lake):
        rel = lake.gt.related_tables("crimes__000")
        assert rel == {"crimes__001", "crimes__002"}

    def test_tables_related_symmetric(self, lake):
        assert lake.gt.tables_related("schools__000", "schools__001")
        assert lake.gt.tables_related("schools__001", "schools__000")
        assert not lake.gt.tables_related("schools__000", "crimes__000")

    def test_self_not_related(self, lake):
        assert not lake.gt.tables_related("schools__000", "schools__000")

    def test_col_origin_covers_all_columns(self, lake):
        for name, df in lake.tables.items():
            for c in df.columns:
                assert (name, str(c)) in lake.gt.col_origin

    def test_attr_domain_cross_base(self, lake):
        # Any two 'city'-domain columns are attribute-related (Definition 1).
        city_attrs = [
            (t, c)
            for (t, c), (_, _, dom) in lake.gt.col_origin.items()
            if dom == "city"
        ]
        assert len(city_attrs) >= 2
        (t1, c1), (t2, c2) = city_attrs[0], city_attrs[1]
        assert lake.gt.attrs_related(t1, c1, t2, c2)

    def test_attr_domains_differ(self, lake):
        assert not lake.gt.attrs_related(
            "crimes__000",
            [c for c in lake.tables["crimes__000"].columns if c == "reports"][0],
            "schools__000",
            "pupils",
        ) or "reports" not in lake.tables["crimes__000"].columns

    def test_subject_recorded(self, lake):
        for t in lake.tables:
            subj = lake.gt.subject_of[t]
            if subj is not None:
                assert subj in lake.tables[t].columns

    def test_most_tables_keep_subject(self, lake):
        kept = sum(1 for t in lake.tables if lake.gt.subject_of[t] is not None)
        assert kept / lake.n_tables > 0.6


class TestDerivation:
    def test_projection_of_base_columns(self, lake):
        for name, df in lake.tables.items():
            base = lake.gt.base_of[name]
            base_cols = {c.name for c in BASE_SPECS[base]}
            origins = {lake.gt.col_origin[(name, str(c))][1] for c in df.columns}
            assert origins <= base_cols

    def test_row_sample_fraction(self, lake):
        # Rows are a 40-90% selection of the base table.
        by_base: dict[str, int] = {}
        for name, df in lake.tables.items():
            base = lake.gt.base_of[name]
            by_base[base] = max(by_base.get(base, 0), len(df))
        for base, max_rows in by_base.items():
            assert max_rows >= 5

    def test_siblings_share_values_on_clean_lake(self, lake):
        a = lake.tables["gp_practices__000"]
        b = lake.tables["gp_practices__001"]
        shared_cols = set(a.columns) & set(b.columns)
        assert shared_cols
        col = sorted(shared_cols)[0]
        overlap = set(a[col].astype(str)) & set(b[col].astype(str))
        assert len(overlap) > 0


class TestNoise:
    def test_noise_renames_some_columns(self, dirty):
        base_cols = {c.name for cols in BASE_SPECS.values() for c in cols}
        renamed = [
            c
            for name, df in dirty.tables.items()
            for c in df.columns
            if str(c) not in base_cols
        ]
        assert len(renamed) > 0

    def test_noise_injects_nulls(self, dirty):
        total_nulls = sum(int(df.isna().sum().sum()) for df in dirty.tables.values())
        assert total_nulls > 0

    def test_noise_perturbs_formats(self, dirty):
        # Some postcode column should have lost its space or case.
        perturbed = 0
        for name, df in dirty.tables.items():
            for c in df.columns:
                _, base_col, dom = dirty.gt.col_origin[(name, str(c))]
                if dom == "postcode":
                    vals = df[c].dropna().astype(str)
                    if len(vals) and not vals.str.contains(" ").all():
                        perturbed += 1
        assert perturbed > 0

    def test_gt_tracks_renamed_columns(self, dirty):
        for name, df in dirty.tables.items():
            for c in df.columns:
                assert (name, str(c)) in dirty.gt.col_origin

    def test_numeric_columns_not_perturbed(self, dirty):
        for name, df in dirty.tables.items():
            for c in df.columns:
                _, base_col, dom = dirty.gt.col_origin[(name, str(c))]
                spec_numeric = any(
                    s.numeric and s.name == base_col
                    for s in BASE_SPECS[dirty.gt.base_of[name]]
                )
                if spec_numeric:
                    assert pd.api.types.is_numeric_dtype(df[c].dropna()), (name, c)
