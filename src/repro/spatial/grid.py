"""Grid tiling for spatial self-joins.

Records are assigned an integer tile ``(_cx, _cy)`` whose side is at least
the search radius ``d`` (in degrees, converted at the dataset's extreme
latitude so the tile is never *smaller* than ``d`` anywhere in the extent).
Any two points within ``d`` of each other then land in the same tile or in
one of its 8 neighbors, so a range join becomes: explode one side over the
3×3 tile neighborhood, equi-join on the tile key, filter on true distance.
Catalyst runs this as a shuffle hash/sort-merge join — no cross join.
"""
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.spatial.geo import M_PER_DEG_LAT, meters_per_degree_lon

#: Safety margin on tile size: the distance filter uses the exact metric
#: while tiles are sized by the projection, so oversize tiles slightly to
#: guarantee no in-range pair ever spans more than one tile boundary.
_TILE_PAD = 1.01

CELL_X = "_cx"
CELL_Y = "_cy"


def tile_sizes_deg(d_m: float, max_abs_lat_deg: float) -> tuple[float, float]:
    """(lat_deg, lon_deg) tile side for radius ``d_m`` meters.

    Longitude degrees shrink toward the poles, so the conversion uses the
    extent's extreme latitude — the tile is then >= ``d_m`` everywhere.
    """
    if d_m <= 0:
        raise ValueError(f"tile radius must be positive, got {d_m}")
    lat_deg = d_m * _TILE_PAD / M_PER_DEG_LAT
    m_lon = meters_per_degree_lon(max_abs_lat_deg)
    if m_lon <= 0:  # exactly polar; whole-world lon tiles
        return lat_deg, 360.0
    # Near the pole cos(lat) underflows toward 0 and the tile would exceed
    # the globe — clamp to one world-spanning tile.
    return lat_deg, min(d_m * _TILE_PAD / m_lon, 360.0)


def with_tiles(
    df: DataFrame, *, d_m: float, max_abs_lat_deg: float, lat_col: str, lon_col: str
) -> DataFrame:
    """Add integer tile coordinates ``(_cx, _cy)`` for radius ``d_m``."""
    lat_deg, lon_deg = tile_sizes_deg(d_m, max_abs_lat_deg)
    return df.withColumn(
        CELL_X, F.floor(F.col(lon_col) / F.lit(lon_deg)).cast("long")
    ).withColumn(CELL_Y, F.floor(F.col(lat_col) / F.lit(lat_deg)).cast("long"))


def explode_neighborhood(df: DataFrame) -> DataFrame:
    """Replicate each row over its 3×3 tile neighborhood.

    The exploded side is the *probe* side of the join: probing all 9
    neighbor tiles against build-side rows keyed by their own tile finds
    every pair within one tile-length, hence every pair within ``d``.
    """
    offsets = F.array(
        *[
            F.struct(F.lit(dx).alias("dx"), F.lit(dy).alias("dy"))
            for dx in (-1, 0, 1)
            for dy in (-1, 0, 1)
        ]
    )
    return (
        df.withColumn("_off", F.explode(offsets))
        .withColumn(CELL_X, F.col(CELL_X) + F.col("_off.dx"))
        .withColumn(CELL_Y, F.col(CELL_Y) + F.col("_off.dy"))
        .drop("_off")
    )
