"""MinHash signatures over per-attribute feature sets (paper §III-B).

The paper hashes each attribute's set representation (qset/tset/rset) with
256 MinHash permutations; the fraction of equal signature positions is an
unbiased estimator of Jaccard similarity [Broder'97].

Two entry points:

* :func:`signature` — the pure numpy kernel over pre-hashed elements.
* :func:`signatures_df` — the Spark pipeline: a feature DataFrame
  ``(attr_id, feature)`` is hashed with ``xxhash64`` and reduced per
  attribute with ``applyInPandas`` (a vectorised numeric kernel with no
  relational structure, per DESIGN.md layering).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
import pyspark.sql.functions as F
from pyspark.sql import DataFrame
from pyspark.sql.types import ArrayType, LongType, StringType, StructField, StructType

from repro.core.hashing import HashFamily

#: Paper's MinHash size (§V footnote 5).
DEFAULT_N_HASHES = 256

_SIG_SCHEMA = StructType(
    [
        StructField("attr_id", StringType(), False),
        StructField("sig", ArrayType(LongType(), False), False),
    ]
)


def signature(element_hashes: np.ndarray, family: HashFamily) -> np.ndarray:
    """MinHash signature (uint64, shape ``(family.n,)``) of a set of element hashes.

    An empty set gets the all-max sentinel signature, which collides with
    nothing (including other empty sets' bands, which *do* collide with each
    other — callers drop empty feature sets before indexing).
    """
    if len(element_hashes) == 0:
        return np.full(family.n, np.iinfo(np.uint64).max, dtype=np.uint64)
    return family.apply(element_hashes).min(axis=0)


def estimate_jaccard(sig_a: np.ndarray, sig_b: np.ndarray) -> float:
    """Fraction of equal positions — the MinHash Jaccard estimate."""
    sig_a = np.asarray(sig_a)
    sig_b = np.asarray(sig_b)
    return float(np.mean(sig_a == sig_b))


def exact_jaccard(a: set, b: set) -> float:
    """Reference exact Jaccard similarity (test oracle for the estimator)."""
    if not a and not b:
        return 1.0
    return len(a & b) / len(a | b)


def signatures_df(
    features: DataFrame,
    *,
    n_hashes: int = DEFAULT_N_HASHES,
    seed: int = 7,
) -> DataFrame:
    """Compute MinHash signatures for every attribute in ``features``.

    ``features`` must have columns ``attr_id`` (string) and ``feature``
    (string). Returns ``(attr_id, sig: array<long>)`` with one row per
    attribute that has at least one feature. Signatures are stored as signed
    64-bit reinterpretations of the uint64 values (Spark has no unsigned
    type); equality comparisons are unaffected.
    """
    family = HashFamily.create(n_hashes, seed)
    hashed = features.select(
        F.col("attr_id"), F.xxhash64(F.col("feature")).alias("h")
    )

    def _reduce(pdf: pd.DataFrame) -> pd.DataFrame:
        elems = pdf["h"].to_numpy(dtype=np.int64).view(np.uint64)
        sig = signature(np.unique(elems), family).view(np.int64)
        return pd.DataFrame({"attr_id": [pdf["attr_id"].iloc[0]], "sig": [sig.tolist()]})

    return hashed.groupBy("attr_id").applyInPandas(_reduce, schema=_SIG_SCHEMA)
