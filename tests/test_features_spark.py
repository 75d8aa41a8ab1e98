"""Feature extraction as DataFrame transforms (Alg. 1 / Example 2),
including the paper's worked examples and DuckDB oracle checks."""
import pandas as pd
import pyspark.sql.functions as F
import pytest

from repro.core import features
from repro.embedding.wem import WordEmbeddingModel
from repro.lake import tables
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def example2_cells(spark):
    """Paper Example 2: attribute 'Address' with three street values."""
    pdf = pd.DataFrame(
        {
            "Address": [
                "18 Portland Street, M1 3BE",
                "41 Oxford Road, M13 9PL",
                "9 Mirabel Street, M3 1NN",
            ]
        }
    )
    return tables.cells_df(spark, {"ex": pdf}).cache()


@pytest.fixture(scope="module")
def example2_attrs(example2_cells):
    return tables.attrs_df(example2_cells)


class TestNameQgrams:
    def test_paper_example(self, example2_attrs):
        got = {
            r["feature"]
            for r in features.name_qgrams(example2_attrs).collect()
        }
        assert got == {"addr", "ddre", "dres", "ress"}

    def test_short_name_is_own_gram(self, spark):
        cells = tables.cells_df(spark, {"t": pd.DataFrame({"id": ["x"]})})
        got = {r["feature"] for r in features.name_qgrams(tables.attrs_df(cells)).collect()}
        assert got == {"id"}

    def test_name_cleaning(self, spark):
        cells = tables.cells_df(spark, {"t": pd.DataFrame({"Post Code": ["x"]})})
        got = {r["feature"] for r in features.name_qgrams(tables.attrs_df(cells)).collect()}
        assert got == {"post", "ostc", "stco", "tcod", "code"}

    def test_q_configurable(self, example2_attrs):
        got = {r["feature"] for r in features.name_qgrams(example2_attrs, q=3).collect()}
        assert got == {"add", "ddr", "dre", "res", "ess"}

    def test_distinct(self, spark):
        cells = tables.cells_df(spark, {"t": pd.DataFrame({"aaaa": ["x"]})})
        rows = features.name_qgrams(tables.attrs_df(cells)).collect()
        assert len(rows) == 1  # 'aaaa' -> single distinct gram


class TestTokens:
    def test_infrequent_picks_rare_word_per_part(self, example2_cells):
        tset = {
            r["feature"] for r in features.informative_tokens(example2_cells).collect()
        }
        # 'street' appears twice, the street names once each -> the names win.
        assert {"portland", "oxford", "mirabel"} <= tset
        assert "street" not in tset

    def test_frequent_picks_common_word_per_part(self, example2_cells):
        eset = {
            r["feature"] for r in features.frequent_tokens(example2_cells).collect()
        }
        assert "street" in eset

    def test_postcode_parts_tokenised(self, example2_cells):
        tset = {
            r["feature"] for r in features.informative_tokens(example2_cells).collect()
        }
        # Postcodes follow a comma -> their own part; both words are unique
        # in the extent so the tie-break (alphabetical) picks one of them.
        assert any(t in tset for t in ("m1", "3be", "m13", "9pl"))

    def test_numeric_attrs_excluded(self, spark):
        cells = tables.cells_df(
            spark, {"t": pd.DataFrame({"n": [1, 2, 3], "s": ["a b", "a c", "a d"]})}
        )
        tok_attrs = {
            r["attr_id"] for r in features.informative_tokens(cells).collect()
        }
        assert tok_attrs == {"t||s"}

    def test_token_histogram_oracle(self, spark, example2_cells):
        """The histogram (Alg. 1's H) agrees with DuckDB's count over an
        equivalently exploded token table."""
        hist = features.token_histogram(example2_cells)
        words_pdf = (
            example2_cells.where(~F.col("is_numeric"))
            .select(
                "attr_id",
                F.explode(
                    F.split(F.col("value"), r"[.,;:/\-()\[\]@_]+")
                ).alias("part"),
            )
            .select(
                "attr_id",
                F.explode(F.split(F.lower(F.trim("part")), r"\s+")).alias("word"),
            )
            .where(F.col("word") != "")
            .toPandas()
        )
        assert_equivalent(
            hist,
            "SELECT attr_id, word, count(*) AS cnt FROM words GROUP BY attr_id, word",
            words=words_pdf,
        )

    def test_lowercasing(self, spark):
        cells = tables.cells_df(spark, {"t": pd.DataFrame({"s": ["Hello World"]})})
        tset = {r["feature"] for r in features.informative_tokens(cells).collect()}
        assert tset <= {"hello", "world"}


class TestFormatStringsSpark:
    def test_rset_of_example(self, example2_cells):
        rset = {
            r["feature"]
            for r in features.format_strings(example2_cells)
            .where(F.col("attr_id") == "ex||Address")
            .collect()
        }
        assert rset == {"NC+PA+"}

    def test_numeric_attrs_included(self, spark):
        cells = tables.cells_df(spark, {"t": pd.DataFrame({"n": [10, 20]})})
        rows = features.format_strings(cells).collect()
        assert {r["feature"] for r in rows} == {"N"}

    def test_distinct_formats(self, spark):
        cells = tables.cells_df(
            spark, {"t": pd.DataFrame({"s": ["M1 3BE", "BT7 1JL", "hello"]})}
        )
        rset = {r["feature"] for r in features.format_strings(cells).collect()}
        assert rset == {"A+", "L"}


class TestEmbeddingVectors:
    def test_vector_per_textual_attr(self, spark):
        wem = WordEmbeddingModel()
        cells = tables.cells_df(
            spark,
            {"t": pd.DataFrame({"s": ["Oxford Road", "Church Street"], "n": [1, 2]})},
        )
        rows = features.embedding_vectors(cells, wem).collect()
        assert {r["attr_id"] for r in rows} == {"t||s"}
        assert len(rows[0]["vec"]) == wem.dim

    def test_same_domain_attrs_close(self, spark):
        import numpy as np

        wem = WordEmbeddingModel()
        cells = tables.cells_df(
            spark,
            {
                "t1": pd.DataFrame({"addr": ["1 Oxford Road", "2 Mill Road", "3 Park Road"]}),
                "t2": pd.DataFrame({"loc": ["9 Church Street", "4 King Street"]}),
                "t3": pd.DataFrame({"sector": ["retail", "finance", "logistics"]}),
            },
        )
        vecs = {r["attr_id"]: np.array(r["vec"]) for r in features.embedding_vectors(cells, wem).collect()}

        def cos(a, b):
            return float(a @ b / (np.linalg.norm(a) * np.linalg.norm(b)))

        assert cos(vecs["t1||addr"], vecs["t2||loc"]) > cos(vecs["t1||addr"], vecs["t3||sector"])
