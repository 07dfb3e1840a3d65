"""The paper's worked example (Figure 3, Table 2, Figure 4) as DataFrames.

Seven records r1..r7 around the Manhattan/Queens boundary, a SpatialRange
constraint with d = 1 km and W = (1 − D/d)², the literal DistanceMatrix of
Figure 3c, and the whole-dataset value frequencies of Figure 3b
(|D| = 1000). Tests and the Table-2 job assert Sparcle's stage outputs
against the paper's printed numbers.

Two arithmetic typos in the paper are corrected here (documented in
DESIGN.md §3): Table 2 prints r5/S.Island's summed weight as 0.01 although
the (r5, r1) DistanceMatrix row carries W = 0.04, and §5.3 prints
``1*(0.64+0.85)`` for the factor sum that its own total (0.77) shows to be
``1*(0.64+0.25)``. All qualitative outcomes (pruning, labeling, favored
values) are unchanged.
"""
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

MAN = "Manhattan"
QUE = "Queens"
SIS = "S. Island"
BRX = "Bronx"
BRK = "Brooklyn"

#: Figure 3a — the seven records' raw Borough values (r3 is Manhattan per
#: the DistanceMatrix v1 column).
TOY_RECORDS = [
    (1, SIS), (2, MAN), (3, MAN), (4, QUE), (5, QUE), (6, QUE), (7, QUE),
]

#: Figure 3c — (R1, R2, v1, v2, D, W) with d = 1000 m, W = (1 − D/d)².
TOY_DM = [
    (1, 2, SIS, MAN, 200.0, 0.64),
    (1, 3, SIS, MAN, 500.0, 0.25),
    (1, 4, SIS, QUE, 800.0, 0.04),
    (1, 5, SIS, QUE, 800.0, 0.04),
    (1, 6, SIS, QUE, 800.0, 0.04),
    (2, 1, MAN, SIS, 200.0, 0.64),
    (2, 3, MAN, MAN, 600.0, 0.16),
    (2, 4, MAN, QUE, 900.0, 0.01),
    (3, 1, MAN, SIS, 500.0, 0.25),
    (3, 2, MAN, MAN, 600.0, 0.16),
    (4, 1, QUE, SIS, 800.0, 0.04),
    (4, 2, QUE, MAN, 900.0, 0.01),
    (4, 5, QUE, QUE, 600.0, 0.16),
    (5, 1, QUE, SIS, 800.0, 0.04),
    (5, 4, QUE, QUE, 600.0, 0.16),
    (5, 6, QUE, QUE, 600.0, 0.16),
    (5, 7, QUE, QUE, 900.0, 0.01),
    (6, 1, QUE, SIS, 800.0, 0.04),
    (6, 5, QUE, QUE, 600.0, 0.16),
    (7, 5, QUE, QUE, 900.0, 0.01),
]

#: Figure 3b — whole-dataset value frequencies; |D| = 1000.
TOY_FREQ = [(BRX, 100), (BRK, 200), (MAN, 300), (QUE, 300), (SIS, 100)]
TOY_TOTAL = 1000


def toy_df(spark: SparkSession) -> DataFrame:
    return spark.createDataFrame(
        pd.DataFrame(TOY_RECORDS, columns=["rid", "borough"])
    )


def toy_dm(spark: SparkSession) -> DataFrame:
    return spark.createDataFrame(
        pd.DataFrame(TOY_DM, columns=["r1", "r2", "v1", "v2", "dist_m", "w"])
    )


def toy_freq(spark: SparkSession) -> DataFrame:
    return spark.createDataFrame(pd.DataFrame(TOY_FREQ, columns=["value", "cnt"]))
