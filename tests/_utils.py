"""Shared test helpers (not collected by pytest)."""
import numpy as np
import pandas as pd

from repro.spatial.geo import M_PER_DEG_LAT, meters_per_degree_lon

BBOX_SMALL = (41.80, 41.90, -87.70, -87.60)  # ~11 km × 8 km patch of Chicago


def rand_points(n: int, *, seed: int = 0, bbox=BBOX_SMALL) -> pd.DataFrame:
    """Uniform random (rid, lat, lon) points inside ``bbox``."""
    lat_min, lat_max, lon_min, lon_max = bbox
    g = np.random.default_rng(seed)
    return pd.DataFrame(
        {
            "rid": np.arange(n, dtype=np.int64),
            "lat": g.uniform(lat_min, lat_max, n),
            "lon": g.uniform(lon_min, lon_max, n),
        }
    )


def equirect_np(pdf: pd.DataFrame, ref_lat: float) -> np.ndarray:
    """All-pairs equirectangular distance matrix (meters), numpy brute force."""
    m_lon = meters_per_degree_lon(ref_lat)
    dx = (pdf["lon"].values[:, None] - pdf["lon"].values[None, :]) * m_lon
    dy = (pdf["lat"].values[:, None] - pdf["lat"].values[None, :]) * M_PER_DEG_LAT
    return np.sqrt(dx * dx + dy * dy)


def equirect_sql(ref_lat: float) -> str:
    """DuckDB expression template for the same equirectangular distance."""
    m_lon = meters_per_degree_lon(ref_lat)
    return (
        f"sqrt(pow((b.lon - a.lon) * {m_lon!r}, 2) + "
        f"pow((b.lat - a.lat) * {M_PER_DEG_LAT!r}, 2))"
    )


def haversine_sql() -> str:
    """DuckDB expression for the haversine distance (meters)."""
    R = 6_371_008.8
    return (
        f"2 * {R!r} * asin(sqrt("
        "pow(sin(radians(b.lat - a.lat) / 2), 2) + "
        "cos(radians(a.lat)) * cos(radians(b.lat)) * "
        "pow(sin(radians(b.lon - a.lon) / 2), 2)))"
    )


def pairs_set(df) -> set:
    """Spark or pandas pair frame → {(r1, r2)} set."""
    pdf = df.toPandas() if hasattr(df, "toPandas") else df
    return set(zip(pdf["r1"].astype(int), pdf["r2"].astype(int)))
