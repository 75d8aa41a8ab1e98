"""Subject-attribute detection (paper §III-C).

The paper trains a supervised model (after Venetis et al.) on 350 labelled
data.gov.uk tables, reporting ~89% accuracy, and notes the learned bias:
"favours leftmost non-numeric attributes with fewer nulls and many distinct
values". We reproduce exactly that: a logistic regression over five
features of each attribute —

* ``pos_frac``      — column position / (arity - 1)  (leftmost bias)
* ``non_numeric``   — 1.0 if the attribute is non-numeric
* ``null_ratio``    — fraction of missing cells
* ``distinct_ratio``— distinct values / non-null values
* ``avg_len``       — mean rendered length (entity names are longish)

— trained on generator tables whose subject column is known from ground
truth (our substitute for the manual data.gov.uk labels). As in the paper,
each dataset has exactly one subject attribute and it is non-numeric.
"""
from __future__ import annotations

from functools import lru_cache

import numpy as np
import pandas as pd
import pyspark.sql.functions as F
from pyspark.sql import DataFrame

from repro.ml.logreg import LogisticRegression

FEATURES = ["pos_frac", "non_numeric", "null_ratio", "distinct_ratio", "avg_len"]


def attribute_features(cells: DataFrame) -> DataFrame:
    """Per-attribute detector features, from the long-format cells."""
    table_stats = cells.groupBy("table").agg(
        (F.max("row_idx") + 1).alias("n_rows"),
        (F.max("col_idx") + 1).alias("n_cols"),
    )
    per_attr = cells.groupBy("attr_id", "table", "col_idx").agg(
        F.max("is_numeric").alias("is_numeric"),
        F.count("*").alias("n_values"),
        F.countDistinct("value").alias("n_distinct"),
        F.avg(F.length("value")).alias("avg_len"),
    )
    return per_attr.join(table_stats, "table").select(
        "attr_id",
        "table",
        (F.col("col_idx") / F.greatest(F.col("n_cols") - 1, F.lit(1))).alias("pos_frac"),
        (1 - F.col("is_numeric").cast("double")).alias("non_numeric"),
        (1.0 - F.col("n_values") / F.col("n_rows")).alias("null_ratio"),
        (F.col("n_distinct") / F.col("n_values")).alias("distinct_ratio"),
        F.col("avg_len"),
    )


def attribute_features_pandas(tables: dict[str, pd.DataFrame]) -> pd.DataFrame:
    """Driver-side mirror of :func:`attribute_features` (used to train the
    default model without a SparkSession; a test pins the two paths equal)."""
    cols = ["attr_id", "table", "col_name", *FEATURES]
    rows = []
    for table in sorted(tables):
        df = tables[table]
        n_rows, n_cols = df.shape
        for col_idx, col in enumerate(df.columns):
            s = df[col]
            non_null = s.dropna()
            numeric = pd.api.types.is_numeric_dtype(s)
            rendered = non_null.astype(str)
            rows.append(
                {
                    "attr_id": f"{table}||{col}",
                    "table": table,
                    "col_name": str(col),
                    "pos_frac": col_idx / max(n_cols - 1, 1),
                    "non_numeric": 0.0 if numeric else 1.0,
                    "null_ratio": 1.0 - len(non_null) / max(n_rows, 1),
                    "distinct_ratio": non_null.nunique() / max(len(non_null), 1),
                    "avg_len": float(rendered.str.len().mean()) if len(rendered) else 0.0,
                }
            )
    return pd.DataFrame(rows, columns=cols)


def train_subject_model(features: pd.DataFrame, is_subject: np.ndarray) -> LogisticRegression:
    """Fit the detector on labelled attribute features."""
    X = features[FEATURES].to_numpy(dtype=np.float64)
    return LogisticRegression().fit(X, np.asarray(is_subject, dtype=np.float64))


@lru_cache(maxsize=1)
def default_model() -> LogisticRegression:
    """Detector trained on a fixed labelled lake (data.gov.uk substitute)."""
    from repro.lake.generator import generate_lake

    lake = generate_lake(derivations_per_base=4, rows=80, noise=0.3, seed=1234)
    feats = attribute_features_pandas(lake.tables)
    labels = np.array(
        [
            1.0 if lake.gt.subject_of[t] == c else 0.0
            for t, c in zip(feats["table"], feats["col_name"])
        ]
    )
    return train_subject_model(feats, labels)


def pick_subjects(features: pd.DataFrame, model: LogisticRegression | None = None) -> pd.DataFrame:
    """Argmax the detector over each table's non-numeric attributes.

    Returns ``(table, attr_id)``; tables with no non-numeric attribute have
    no subject (paper: the subject attribute has non-numeric values).
    """
    model = model or default_model()
    if features.empty:
        return pd.DataFrame({"table": pd.Series(dtype=str), "attr_id": pd.Series(dtype=str)})
    feats = features[features["non_numeric"] > 0.5].copy()
    if feats.empty:
        return pd.DataFrame({"table": pd.Series(dtype=str), "attr_id": pd.Series(dtype=str)})
    feats["p"] = model.predict_proba(feats[FEATURES].to_numpy(dtype=np.float64))
    # Stable leftmost tie-break: sort by (p desc, pos_frac asc).
    feats = feats.sort_values(["table", "p", "pos_frac"], ascending=[True, False, True])
    top = feats.groupby("table", as_index=False).first()
    return top[["table", "attr_id"]].reset_index(drop=True)


def subject_attributes(cells: DataFrame, model: LogisticRegression | None = None) -> DataFrame:
    """Spark wrapper: ``(table, attr_id)`` subject attribute per lake table."""
    feats = attribute_features(cells).toPandas()
    picked = pick_subjects(feats, model)
    return cells.sparkSession.createDataFrame(picked, schema="table string, attr_id string")
