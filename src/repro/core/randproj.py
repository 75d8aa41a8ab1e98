"""Random-projection (SimHash) signatures for cosine similarity (paper §III-B).

E-relatedness is grounded on the cosine distance between attribute
word-embedding vectors; the paper approximates it with Charikar's random
hyperplane LSH: bit_i = sign(v . r_i). The Hamming fraction h between two
bit signatures estimates the angle, so cos_sim ~= cos(pi * h).

Bit signatures are stored as ``array<long>`` of 0/1 so the banded LSH module
(:mod:`repro.core.lsh`) treats MinHash and SimHash signatures uniformly.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql.types import ArrayType, LongType, StringType, StructField, StructType

#: Paper uses 256 hash functions for all LSH indexes (§V footnote 5).
DEFAULT_N_BITS = 256

_SIG_SCHEMA = StructType(
    [
        StructField("attr_id", StringType(), False),
        StructField("sig", ArrayType(LongType(), False), False),
    ]
)


def hyperplanes(n_bits: int, dim: int, seed: int = 11) -> np.ndarray:
    """Gaussian random hyperplanes, shape ``(n_bits, dim)``."""
    return np.random.default_rng(seed).standard_normal((n_bits, dim))


def bit_signature(vec: np.ndarray, planes: np.ndarray) -> np.ndarray:
    """Sign-bit signature (int64 0/1, shape ``(n_bits,)``) of one vector."""
    return (planes @ np.asarray(vec, dtype=np.float64) >= 0.0).astype(np.int64)


def estimate_cosine(sig_a: np.ndarray, sig_b: np.ndarray) -> float:
    """Cosine-similarity estimate from two bit signatures: cos(pi * hamming)."""
    ham = float(np.mean(np.asarray(sig_a) != np.asarray(sig_b)))
    return float(np.cos(np.pi * ham))


def exact_cosine(a: np.ndarray, b: np.ndarray) -> float:
    """Reference exact cosine similarity (test oracle for the estimator)."""
    na, nb = np.linalg.norm(a), np.linalg.norm(b)
    if na == 0.0 or nb == 0.0:
        return 0.0
    return float(np.dot(a, b) / (na * nb))


def bit_signatures_df(
    vectors: DataFrame,
    *,
    dim: int,
    n_bits: int = DEFAULT_N_BITS,
    seed: int = 11,
) -> DataFrame:
    """Bit signatures for a DataFrame ``(attr_id, vec: array<double>)``.

    ``vec`` is the attribute's aggregate embedding (paper: union of the
    frequent-token embedding vectors, which we aggregate by mean before
    projecting — equivalent up to scaling, and sign bits are scale-free).
    """
    planes = hyperplanes(n_bits, dim, seed)

    def _project(batch: pd.DataFrame) -> pd.DataFrame:
        if batch.empty:
            return pd.DataFrame({"attr_id": pd.Series(dtype=str), "sig": pd.Series(dtype=object)})
        mat = np.stack(batch["vec"].map(lambda v: np.asarray(v, dtype=np.float64)))
        bits = (mat @ planes.T >= 0.0).astype(np.int64)
        return pd.DataFrame(
            {"attr_id": batch["attr_id"], "sig": [row.tolist() for row in bits]}
        )

    return vectors.mapInPandas(lambda it: map(_project, it), schema=_SIG_SCHEMA)
