"""Spatial candidate generator (§4, Algorithm 2).

Three phases per erroneous cell:

1. **Initial candidates** (§4.1): the values of all spatial neighbors,
   weighted by the summed DistanceMatrix weights (nearby co-occurrence
   instead of exact co-occurrence), plus the cell's own value at the
   default minimal weight 0.01 when no neighbor shares it.
2. **Probability estimation** (§4.2): spatially-aware Naive Bayes —
   ``Prob(C = v) = |Spatial(v,R)|/|D| × Π_{A'} Count((v,R.A'),D)/Count(v,D)``
   with the record-identifier factor following the minimality principle
   (1 for the cell's original value, 0.1 otherwise).
3. **Labeling and cutoffs** (§4.3): normalise per cell, drop candidates
   below ``MinProb``, and label a cell clean when a single candidate
   remains or the top one exceeds ``MaxProb``.

Everything is DataFrame algebra: group-bys over the DistanceMatrix, joins
against the value-frequency table, and window normalisation — no per-row
Python.
"""
from dataclasses import dataclass
from typing import Sequence

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.core.distance_matrix import V2, W
from repro.spatial.join import R1

VALUE = "value"
WEIGHT = "weight"  # phase-1 sum of weights (|Spatial(v, R)|, or 0.01 default)
SPATIAL_WEIGHT = "spatial_weight"  # neighbor-only part (0 if own-value-only)
PROB = "prob"
PROB_NORM = "prob_norm"

#: Default minimal weight for the cell's own value when no neighbor shares
#: it (§4.1), and the minimality-principle pseudo-count (§4.2).
DEFAULT_OWN_WEIGHT = 0.01
MINIMALITY_PSEUDO_COUNT = 0.1


@dataclass(frozen=True)
class CandidateResult:
    """Output of Algorithm 2.

    ``candidates`` holds the surviving candidate values for cells that are
    *still* erroneous; ``labels`` holds cells confidently resolved in
    phase 3 (their label is a final repair); ``remaining_error_ids`` is
    the erroneous set minus the labeled cells.
    """

    candidates: DataFrame  # id_col, value, weight, spatial_weight, prob, prob_norm
    labels: DataFrame  # id_col, label
    remaining_error_ids: DataFrame  # id_col


def value_frequency(df: DataFrame, attribute: str) -> DataFrame:
    """``Count(v, D)`` per non-null value — Figure 3b's statistics table."""
    return (
        df.where(F.col(attribute).isNotNull())
        .groupBy(F.col(attribute).alias(VALUE))
        .agg(F.count(F.lit(1)).alias("cnt"))
    )


def generate_candidates(
    df: DataFrame,
    dm: DataFrame,
    error_ids: DataFrame,
    *,
    attribute: str,
    id_col: str = "rid",
    other_attrs: Sequence[str] = (),
    min_prob: float = 0.05,
    max_prob: float = 0.95,
    freq: DataFrame | None = None,
    total: int | None = None,
) -> CandidateResult:
    """Run all three phases; see module docstring.

    ``freq``/``total`` default to statistics of ``df`` and are overridable
    so the paper's worked example (Figure 3b: |D| = 1000) is testable
    verbatim.
    """
    freq = freq if freq is not None else value_frequency(df, attribute)
    total = total if total is not None else df.count()

    # ---- Phase 1: weighted nearby co-occurrence --------------------------
    err_dm = dm.join(error_ids.select(F.col(id_col).alias(R1)), on=R1)
    neigh = (
        err_dm.where(F.col(V2).isNotNull())
        .groupBy(F.col(R1).alias(id_col), F.col(V2).alias(VALUE))
        .agg(F.sum(W).alias(WEIGHT))
        .withColumn(SPATIAL_WEIGHT, F.col(WEIGHT))
    )
    own = (
        df.join(error_ids, on=id_col, how="leftsemi")
        .where(F.col(attribute).isNotNull())
        .select(F.col(id_col), F.col(attribute).alias(VALUE))
        .join(neigh.select(id_col, VALUE), on=[id_col, VALUE], how="leftanti")
        .withColumn(WEIGHT, F.lit(DEFAULT_OWN_WEIGHT))
        .withColumn(SPATIAL_WEIGHT, F.lit(0.0))
    )
    cands = neigh.unionByName(own)

    # ---- Phase 2: spatially-aware Naive Bayes ---------------------------
    orig = df.select(F.col(id_col), F.col(attribute).alias("_orig"))
    cands = (
        cands.join(orig, on=id_col)
        .join(freq.withColumnRenamed("cnt", "_cnt_v"), on=VALUE, how="left")
        # A candidate value always occurs in D (it is a neighbor's or the
        # cell's own value) but guard the join anyway.
        .withColumn("_cnt_v", F.coalesce(F.col("_cnt_v"), F.lit(1)))
    )
    # Record-identifier factor: 1 for the original value, 0.1 otherwise
    # (both divided by Count(v, D)) — the minimality bias of §4.2.
    prob = (F.col(WEIGHT) / F.lit(float(total))) * (
        F.when(F.col(VALUE).eqNullSafe(F.col("_orig")), F.lit(1.0)).otherwise(
            F.lit(MINIMALITY_PSEUDO_COUNT)
        )
        / F.col("_cnt_v")
    )
    # Generic non-spatial attributes A': Count((v, R.A'), D) / Count(v, D).
    for a in other_attrs:
        coocc = df.where(F.col(attribute).isNotNull()).groupBy(
            F.col(attribute).alias(VALUE), F.col(a).alias(f"_av_{a}")
        ).agg(F.count(F.lit(1)).alias(f"_co_{a}"))
        cands = (
            cands.join(
                df.select(F.col(id_col), F.col(a).alias(f"_av_{a}")), on=id_col
            )
            .join(coocc, on=[VALUE, f"_av_{a}"], how="left")
            .withColumn(
                f"_co_{a}",
                F.coalesce(F.col(f"_co_{a}"), F.lit(MINIMALITY_PSEUDO_COUNT)),
            )
        )
        prob = prob * (F.col(f"_co_{a}") / F.col("_cnt_v"))
    cands = cands.withColumn(PROB, prob)

    # ---- Phase 3: normalisation, MinProb cutoff, MaxProb labeling -------
    cell = Window.partitionBy(id_col)
    cands = cands.withColumn(PROB_NORM, F.col(PROB) / F.sum(PROB).over(cell))
    kept = cands.where(F.col(PROB_NORM) >= F.lit(float(min_prob)))
    order = Window.partitionBy(id_col).orderBy(
        F.col(PROB_NORM).desc(), F.col(VALUE).asc()
    )
    kept = (
        kept.withColumn("_rank", F.row_number().over(order))
        .withColumn("_n_cands", F.count(F.lit(1)).over(cell))
        .withColumn("_top_prob", F.max(PROB_NORM).over(cell))
    )
    labels = (
        kept.where(
            (F.col("_rank") == 1)
            & ((F.col("_n_cands") == 1) | (F.col("_top_prob") > F.lit(float(max_prob))))
        )
        .select(F.col(id_col), F.col(VALUE).alias("label"))
    )
    remaining = kept.join(labels.select(id_col), on=id_col, how="leftanti").select(
        id_col, VALUE, WEIGHT, SPATIAL_WEIGHT, PROB, PROB_NORM
    )
    remaining_ids = error_ids.join(labels.select(id_col), on=id_col, how="leftanti")
    return CandidateResult(
        candidates=remaining, labels=labels, remaining_error_ids=remaining_ids
    )
