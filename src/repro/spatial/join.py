"""Spatial self-joins over (id, lat, lon) DataFrames.

These are the "spatial database" operations the paper delegates to PostGIS
(§3.2): range self-join, kNN self-join, and the degenerate exact-location
self-join used by the non-spatial baseline. All return a pair DataFrame
``(r1, r2, dist_m)`` with ``r1 != r2``; range/exact output is symmetric
(both orientations of each pair), kNN output is directed (``r2`` is among
``r1``'s k nearest).
"""
import math
from dataclasses import dataclass

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.spatial import grid
from repro.spatial.geo import M_PER_DEG_LAT, distance_expr, meters_per_degree_lon

R1 = "r1"
R2 = "r2"
DIST = "dist_m"


@dataclass(frozen=True)
class Extent:
    """Bounding box + count of the input, driving tile sizing and kNN radii."""

    n: int
    lat_min: float
    lat_max: float
    lon_min: float
    lon_max: float

    @property
    def ref_lat(self) -> float:
        return (self.lat_min + self.lat_max) / 2.0

    @property
    def max_abs_lat(self) -> float:
        return max(abs(self.lat_min), abs(self.lat_max))

    @property
    def width_m(self) -> float:
        return (self.lon_max - self.lon_min) * meters_per_degree_lon(self.ref_lat)

    @property
    def height_m(self) -> float:
        return (self.lat_max - self.lat_min) * M_PER_DEG_LAT

    @property
    def diagonal_m(self) -> float:
        return math.hypot(self.width_m, self.height_m)

    @property
    def area_m2(self) -> float:
        return max(self.width_m, 1.0) * max(self.height_m, 1.0)


def compute_extent(df: DataFrame, lat_col: str, lon_col: str) -> Extent:
    """One aggregation pass for the dataset's bounding box and count."""
    row = df.agg(
        F.count(F.lit(1)).alias("n"),
        F.min(lat_col).alias("lat_min"),
        F.max(lat_col).alias("lat_max"),
        F.min(lon_col).alias("lon_min"),
        F.max(lon_col).alias("lon_max"),
    ).first()
    if row["n"] == 0:
        return Extent(0, 0.0, 0.0, 0.0, 0.0)
    return Extent(row["n"], row["lat_min"], row["lat_max"], row["lon_min"], row["lon_max"])


def _pair_join(
    left: DataFrame,
    right: DataFrame,
    *,
    d_m: float,
    extent: Extent,
    id_col: str,
    lat_col: str,
    lon_col: str,
    distance: str,
) -> DataFrame:
    """All (left, right) pairs with distinct ids within ``d_m`` meters."""
    build = grid.with_tiles(
        right.select(
            F.col(id_col).alias(R2),
            F.col(lat_col).alias("_lat2"),
            F.col(lon_col).alias("_lon2"),
        ),
        d_m=d_m,
        max_abs_lat_deg=extent.max_abs_lat,
        lat_col="_lat2",
        lon_col="_lon2",
    )
    probe = grid.explode_neighborhood(
        grid.with_tiles(
            left.select(
                F.col(id_col).alias(R1),
                F.col(lat_col).alias("_lat1"),
                F.col(lon_col).alias("_lon1"),
            ),
            d_m=d_m,
            max_abs_lat_deg=extent.max_abs_lat,
            lat_col="_lat1",
            lon_col="_lon1",
        )
    )
    dist = distance_expr(
        distance,
        F.col("_lat1"),
        F.col("_lon1"),
        F.col("_lat2"),
        F.col("_lon2"),
        extent.ref_lat,
    )
    return (
        probe.join(build, on=[grid.CELL_X, grid.CELL_Y])
        .where(F.col(R1) != F.col(R2))
        .withColumn(DIST, dist)
        .where(F.col(DIST) < F.lit(float(d_m)))
        .select(R1, R2, DIST)
    )


def self_range_join(
    df: DataFrame,
    *,
    d_m: float,
    id_col: str = "rid",
    lat_col: str = "lat",
    lon_col: str = "lon",
    distance: str = "equirect",
    extent: Extent | None = None,
) -> DataFrame:
    """Symmetric pairs ``(r1, r2, dist_m)`` with ``dist_m < d_m``, r1 != r2.

    Matches the paper's ``SpatialRange`` predicate: strict ``F(r1,r2) < d``.
    """
    extent = extent or compute_extent(df, lat_col, lon_col)
    if extent.n == 0:
        return _pair_join(
            df, df, d_m=max(d_m, 1.0), extent=extent, id_col=id_col,
            lat_col=lat_col, lon_col=lon_col, distance=distance,
        )
    return _pair_join(
        df, df, d_m=d_m, extent=extent, id_col=id_col,
        lat_col=lat_col, lon_col=lon_col, distance=distance,
    )


def self_exact_join(
    df: DataFrame,
    *,
    id_col: str = "rid",
    lat_col: str = "lat",
    lon_col: str = "lon",
) -> DataFrame:
    """Pairs at the *same exact* coordinates — the non-spatial baseline.

    This is the equality self-join current cleaning systems run (§3.2):
    co-occurrence exists only where coordinates are duplicated.
    """
    right = df.select(
        F.col(id_col).alias(R2), F.col(lat_col).alias("_lat"), F.col(lon_col).alias("_lon")
    )
    left = df.select(
        F.col(id_col).alias(R1), F.col(lat_col).alias("_lat"), F.col(lon_col).alias("_lon")
    )
    return (
        left.join(right, on=["_lat", "_lon"])
        .where(F.col(R1) != F.col(R2))
        .select(R1, R2, F.lit(0.0).alias(DIST))
    )


def self_knn_join(
    df: DataFrame,
    *,
    k: int,
    id_col: str = "rid",
    lat_col: str = "lat",
    lon_col: str = "lon",
    distance: str = "equirect",
    extent: Extent | None = None,
    max_rounds: int = 8,
) -> DataFrame:
    """Directed k-nearest-neighbor pairs ``(r1, r2, dist_m)``.

    Grid range-join at an estimated radius, then iterative radius doubling
    for the records that found fewer than ``k`` neighbors; a final
    ``row_number`` window trims to exactly ``min(k, n-1)`` per ``r1``
    (ties broken by ``r2`` for determinism). Equivalent to an index-backed
    kNN self-join, expressed as DataFrame rounds.
    """
    if k <= 0:
        raise ValueError(f"k must be positive, got {k}")
    extent = extent or compute_extent(df, lat_col, lon_col)
    spark = df.sparkSession
    if extent.n <= 1:
        return spark.createDataFrame([], schema=f"{R1} long, {R2} long, {DIST} double")

    # Radius such that a disk holds ~3(k+1) points under uniform density.
    density = extent.n / extent.area_m2
    radius = max(
        math.sqrt(3.0 * (k + 1) / (math.pi * density)), extent.diagonal_m / 1024, 1.0
    )
    points = df.select(id_col, lat_col, lon_col)
    unresolved = points
    resolved_parts: list[DataFrame] = []
    for _ in range(max_rounds):
        pairs = _pair_join(
            unresolved, points, d_m=radius, extent=extent, id_col=id_col,
            lat_col=lat_col, lon_col=lon_col, distance=distance,
        )
        exhaustive = radius >= extent.diagonal_m  # radius covers the extent
        counts = pairs.groupBy(R1).agg(F.count(F.lit(1)).alias("_cnt"))
        done_ids = (
            counts.where(F.col("_cnt") >= k) if not exhaustive else counts
        ).select(R1)
        resolved_parts.append(pairs.join(done_ids, on=R1, how="leftsemi"))
        if exhaustive:
            unresolved = None
            break
        unresolved = unresolved.join(
            done_ids.withColumnRenamed(R1, id_col), on=id_col, how="leftanti"
        )
        if unresolved.isEmpty():
            unresolved = None
            break
        radius = min(radius * 2.0, extent.diagonal_m)
    if unresolved is not None:  # max_rounds hit: finish with the full extent
        resolved_parts.append(
            _pair_join(
                unresolved, points, d_m=extent.diagonal_m * 1.01, extent=extent,
                id_col=id_col, lat_col=lat_col, lon_col=lon_col, distance=distance,
            )
        )
    all_pairs = resolved_parts[0]
    for p in resolved_parts[1:]:
        all_pairs = all_pairs.unionByName(p)
    w = Window.partitionBy(R1).orderBy(F.col(DIST).asc(), F.col(R2).asc())
    return (
        all_pairs.withColumn("_rank", F.row_number().over(w))
        .where(F.col("_rank") <= k)
        .select(R1, R2, DIST)
    )
