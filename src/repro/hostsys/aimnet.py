"""AimNet-style error corrector (substrate).

AimNet [49] is the attention-based learner shipping as HoloClean's
open-source error-correction method; it consumes one violation-score
feature vector per cell per constraint. With every non-spatial signal
muted (as the paper does for its comparison), the learned decision reduces
to preferring the candidate with the *least* weighted constraint
violation. Ties break toward the higher candidate probability from
Algorithm 2, then the smaller value for determinism (substitution
documented in DESIGN.md).
"""
from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.core.candidate_gen import PROB_NORM, VALUE
from repro.core.formulator import SCORE

REPAIR = "repair"


def _argbest(features: DataFrame, cands: DataFrame, id_col: str, ascending: bool) -> DataFrame:
    scored = features.join(
        cands.select(id_col, VALUE, PROB_NORM), on=[id_col, VALUE], how="left"
    ).withColumn(PROB_NORM, F.coalesce(F.col(PROB_NORM), F.lit(0.0)))
    score_order = F.col(SCORE).asc() if ascending else F.col(SCORE).desc()
    w = Window.partitionBy(id_col).orderBy(
        score_order, F.col(PROB_NORM).desc(), F.col(VALUE).asc()
    )
    return (
        scored.withColumn("_rank", F.row_number().over(w))
        .where(F.col("_rank") == 1)
        .select(F.col(id_col), F.col(VALUE).alias(REPAIR))
    )


def repair_from_violations(
    features: DataFrame, cands: DataFrame, *, id_col: str = "rid"
) -> DataFrame:
    """Pick, per cell, the candidate minimising the violation score."""
    return _argbest(features, cands, id_col, ascending=True)
