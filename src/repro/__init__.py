"""Reproduction of "Dataset Discovery in Data Lakes" (D3L, ICDE 2020).

Subpackages
-----------
``core``
    The paper's contribution: feature extraction, MinHash / random-projection
    signatures, banded LSH indexes queried via similarity joins, the
    Eq. 1-3 distance-aggregation framework, subject-attribute detection and
    join-path discovery (Algorithms 1-3).
``lake``
    Synthetic data-lake substrate: base tables derived into lake tables by
    random projections/selections (the TUS-benchmark procedure) with a
    dirtiness knob, plus recorded ground truth.
``embedding``
    Synthetic word-embedding model standing in for fastText.
``baselines``
    TUS [Nargesian et al., PVLDB'18] and Aurum [Fernandez et al., ICDE'18]
    reimplementations, plus the synthetic knowledge base TUS depends on.
``ml``
    Minimal logistic regression (no sklearn offline) used for Eq. 3 weights
    and the subject-attribute classifier.
``eval``
    Metrics (precision/recall, coverage, attribute precision) and the
    experiment harness that regenerates every reported table.
"""

__all__ = ["core", "lake", "embedding", "baselines", "ml", "eval"]
