"""Evaluation measures (paper §V-A and §V-E).

* Table-level precision/recall at k: a returned table is a true positive
  iff at least one of its attributes is related to the target in the
  ground truth (the paper's lenient TP interpretation).
* Coverage (Eq. 4/5): the ratio of target attributes that the system
  *aligned* to some attribute of S_i (resp. of the union of join-path
  tables). Coverage is about what the system claims; precision below
  checks the claims.
* Attribute precision: an alignment (target attr, source attr) is a TP iff
  the two attributes are related in the (attribute-level, Definition 1)
  ground truth. For a set of join paths, all source attributes aligned to
  the same target attribute form one group, a TP iff any member is related.
"""
from __future__ import annotations

import pandas as pd

from repro.lake.generator import GroundTruth
from repro.lake.tables import split_attr_id


def precision_recall(returned: list[str], relevant: set[str]) -> tuple[float, float]:
    """Table-level precision/recall of a top-k answer against a GT set."""
    if not returned:
        return 0.0, 0.0
    tp = sum(1 for t in returned if t in relevant)
    precision = tp / len(returned)
    recall = tp / len(relevant) if relevant else 0.0
    return precision, recall


def _aligned(alignments: pd.DataFrame, tables: set[str]) -> pd.DataFrame:
    return alignments[alignments["s_table"].isin(tables)]


def table_coverage(alignments: pd.DataFrame, target_arity: int, table: str) -> float:
    """Eq. 4: fraction of target attributes aligned to some attr of ``table``."""
    if target_arity == 0:
        return 0.0
    covered = _aligned(alignments, {table})["query_attr"].nunique()
    return covered / target_arity


def joinpath_coverage(
    alignments: pd.DataFrame, target_arity: int, tables: set[str]
) -> float:
    """Eq. 5: fraction of target attributes aligned to some attr of any
    table in the union of join paths (``tables`` includes the start S_i)."""
    if target_arity == 0:
        return 0.0
    covered = _aligned(alignments, tables)["query_attr"].nunique()
    return covered / target_arity


def attribute_precision_table(
    alignments: pd.DataFrame, gt: GroundTruth, table: str
) -> float | None:
    """Per-table attribute precision: TP iff the aligned pair is GT-related.

    Returns None when the system produced no alignments for ``table`` (the
    average skips it, as an absent table contributes no populated attributes).
    """
    a = _aligned(alignments, {table})
    if a.empty:
        return None
    tp = 0
    for q_attr, s_attr in zip(a["query_attr"], a["attr_id"]):
        qt, qc = split_attr_id(q_attr)
        st, sc = split_attr_id(s_attr)
        if gt.attrs_related(qt, qc, st, sc):
            tp += 1
    return tp / len(a)


def attribute_precision_joinpaths(
    alignments: pd.DataFrame, gt: GroundTruth, tables: set[str]
) -> float | None:
    """Join-path attribute precision: group source attrs by the target attr
    they align to; a group is a TP iff >= 1 member is GT-related."""
    a = _aligned(alignments, tables)
    if a.empty:
        return None
    tp = fp = 0
    for q_attr, group in a.groupby("query_attr"):
        qt, qc = split_attr_id(q_attr)
        related = any(
            gt.attrs_related(qt, qc, *split_attr_id(s)) for s in group["attr_id"]
        )
        if related:
            tp += 1
        else:
            fp += 1
    return tp / (tp + fp)


def mean_or_zero(values: list[float | None]) -> float:
    """Average of the non-None entries (0.0 if none) — the experiments
    average per-S_i measures over the top-k."""
    vals = [v for v in values if v is not None]
    return sum(vals) / len(vals) if vals else 0.0
