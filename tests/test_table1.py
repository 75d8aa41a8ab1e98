"""Table I reproduction on the literal Figure 1 tables."""
import pytest

from repro.eval.table1 import PAPER_TABLE1, figure1_tables, reproduce_table1


class TestFigure1:
    def test_tables_verbatim(self):
        t = figure1_tables()
        assert list(t["S2"].columns) == ["Practice", "City", "Postcode", "Payment"]
        assert t["S1"]["City"].tolist() == ["Belfast", "Salford"]
        assert t["T"]["Hours"].tolist() == ["07:00-20:00", "08:00-16:00"]

    def test_paper_reference_shape(self):
        assert list(PAPER_TABLE1.columns) == ["pair", "D_n", "D_v", "D_f", "D_e", "D_d"]
        assert len(PAPER_TABLE1) == 3


class TestReproduction:
    @pytest.fixture(scope="class")
    def table1(self, spark):
        return reproduce_table1(spark)

    def test_identical_names_have_zero_name_distance(self, table1):
        for pair in [
            "(T.Practice, S2.Practice)",
            "(T.City, S2.City)",
            "(T.Postcode, S2.Postcode)",
        ]:
            rows = table1[table1["pair"] == pair]
            assert len(rows) == 1, f"{pair} missing from reproduction"
            assert rows["D_n"].iloc[0] == 0.0, pair

    def test_textual_pairs_have_dd_one(self, table1):
        # All three Table I pairs are textual -> D_d = 1 (as in the paper).
        main = table1[table1["pair"].str.contains("Practice,|City,|Postcode,")]
        assert (main["D_d"] == 1.0).all()

    def test_distances_bounded(self, table1):
        for c in ["D_n", "D_v", "D_f", "D_e", "D_d"]:
            assert table1[c].between(0.0, 1.0).all()

    def test_postcode_format_close(self, table1):
        # Postcodes share their format class ('A+') -> small D_f, as the
        # paper's hypothetical 0.1 suggests.
        row = table1[table1["pair"] == "(T.Postcode, S2.Postcode)"]
        assert row["D_f"].iloc[0] <= 0.3
