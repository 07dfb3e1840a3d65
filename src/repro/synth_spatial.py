"""Synthetic spatial datasets with Voronoi-region ground truth.

Stands in for the paper's evaluation data (Table 3): the real Austin-Code,
Chicago-Building and NYC-Crash portals (not available offline) and the
Chicago-Synthetic generator. Each dependent attribute is a planar region
map: ``n_regions`` seed centroids are drawn in the city's bounding box and
a record's *true* value is the label of its nearest centroid (a Voronoi
partition — the paper's "government-issued boundaries" play this role,
and like the paper, no system ever sees the boundaries, only the records).

Error injection matches the knobs the paper reports per dataset:

- ``error_rate`` — fraction of records whose cell is corrupted;
- ``missing_frac`` — of those, the fraction nulled out (vs. set to a
  random *wrong* region label);
- ``dup_ratio`` — of the erroneous records, the fraction relocated to the
  *exact* coordinates of a record that is correct for every attribute
  (the paper's "errors at duplicated locations", Table 1 / Table 3).

Error sets across attributes are nested prefixes of one fixed permutation,
so one record can be wrong in several dependencies (as in the real data,
where the "overall" row of Table 4 counts records fully corrected).

Determinism: everything derives from ``numpy.random.default_rng(seed)``,
so Spark and the DuckDB oracle see identical inputs.
"""
from dataclasses import dataclass, field
from typing import Sequence

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

#: City bounding boxes (lat_min, lat_max, lon_min, lon_max) for the analogs.
BBOX_AUSTIN = (30.10, 30.52, -97.95, -97.56)
BBOX_CHICAGO = (41.64, 42.02, -87.94, -87.52)
BBOX_NYC = (40.49, 40.92, -74.26, -73.69)


@dataclass(frozen=True)
class RegionAttr:
    """One spatial functional dependency ``(lat, lon) → name``."""

    name: str
    n_regions: int
    error_rate: float
    dup_ratio: float = 0.0
    missing_frac: float = 0.5

    def __post_init__(self) -> None:
        if not (0 <= self.error_rate <= 1 and 0 <= self.dup_ratio <= 1):
            raise ValueError(f"rates must be in [0, 1]: {self}")
        if self.n_regions < 2:
            raise ValueError("need >= 2 regions to have wrong values")


def _nearest_region(
    lats: np.ndarray, lons: np.ndarray, cent: np.ndarray, chunk: int = 20_000
) -> np.ndarray:
    """Index of the nearest centroid per point (equirectangular metric)."""
    coslat = np.cos(np.radians(lats.mean()))
    out = np.empty(len(lats), dtype=np.int64)
    for s in range(0, len(lats), chunk):
        e = min(s + chunk, len(lats))
        dy = lats[s:e, None] - cent[None, :, 0]
        dx = (lons[s:e, None] - cent[None, :, 1]) * coslat
        out[s:e] = np.argmin(dx * dx + dy * dy, axis=1)
    return out


def spatial_dataset_pdf(
    *,
    n: int,
    attrs: Sequence[RegionAttr],
    bbox: tuple[float, float, float, float] = BBOX_CHICAGO,
    seed: int = 0,
) -> pd.DataFrame:
    """Generate the dataset as pandas: rid, lat, lon, and per attribute the
    observed column ``a.name`` plus ground truth ``a.name + "__truth"``."""
    lat_min, lat_max, lon_min, lon_max = bbox
    g = np.random.default_rng(seed)
    lats = g.uniform(lat_min, lat_max, n)
    lons = g.uniform(lon_min, lon_max, n)

    perm = g.permutation(n)
    n_err = {a.name: int(round(a.error_rate * n)) for a in attrs}
    n_dup = {a.name: int(round(a.dup_ratio * n_err[a.name])) for a in attrs}
    max_err = max(n_err.values(), default=0)

    # Relocate a duplicated-location set D onto records that are clean for
    # every attribute, so each such error sits at the exact location of a
    # correct record (the paper's duplication semantics). Error sets are
    # nested prefixes of ``perm``, so D is assembled band by band
    # (E_a \ E_prev) to give every attribute exactly its requested
    # |D ∩ E_a| = n_dup[a]; infeasible combinations (a larger error set
    # demanding *fewer* duplicated errors than a smaller one) are clamped
    # to the feasible count.
    dup_parts: list[np.ndarray] = []
    cum_err = cum_dup = 0
    for a in sorted(attrs, key=lambda a: n_err[a.name]):
        band = perm[cum_err:n_err[a.name]]
        need = min(max(n_dup[a.name] - cum_dup, 0), len(band))
        if need > 0:
            dup_parts.append(g.choice(band, size=need, replace=False))
        cum_dup += need
        cum_err = max(cum_err, n_err[a.name])
    if dup_parts:
        dup_ids = np.concatenate(dup_parts)
        clean_everywhere = perm[max_err:]
        if len(clean_everywhere) == 0:
            raise ValueError("dup_ratio needs at least one fully-clean record")
        src = g.choice(clean_everywhere, size=len(dup_ids), replace=True)
        lats[dup_ids] = lats[src]
        lons[dup_ids] = lons[src]

    pdf = pd.DataFrame({"rid": np.arange(n, dtype=np.int64), "lat": lats, "lon": lons})
    for a in attrs:
        cent = np.column_stack(
            [g.uniform(lat_min, lat_max, a.n_regions), g.uniform(lon_min, lon_max, a.n_regions)]
        )
        region = _nearest_region(lats, lons, cent)
        truth = np.array([f"{a.name}_{i}" for i in range(a.n_regions)], dtype=object)[region]
        observed = truth.copy()
        errs = perm[: n_err[a.name]]
        missing = g.random(len(errs)) < a.missing_frac
        # Wrong values: uniform over the other region labels.
        offsets = g.integers(1, a.n_regions, len(errs))
        wrong_idx = (region[errs] + offsets) % a.n_regions
        observed[errs] = np.array(
            [f"{a.name}_{i}" for i in wrong_idx], dtype=object
        )
        observed[errs[missing]] = None
        pdf[a.name] = observed
        pdf[f"{a.name}__truth"] = truth
    return pdf


def spatial_dataset(
    spark: SparkSession,
    *,
    n: int,
    attrs: Sequence[RegionAttr],
    bbox: tuple[float, float, float, float] = BBOX_CHICAGO,
    seed: int = 0,
) -> DataFrame:
    """Spark-side view of :func:`spatial_dataset_pdf`."""
    return spark.createDataFrame(spatial_dataset_pdf(n=n, attrs=attrs, bbox=bbox, seed=seed))


@dataclass(frozen=True)
class AttrStats:
    """Table-3 style properties of one dependency, measured post-hoc."""

    name: str
    records: int
    errors: int
    dup_ratio: float
    distinct: int


def dataset_stats(pdf: pd.DataFrame, attrs: Sequence[RegionAttr]) -> list[AttrStats]:
    """Measure (records, errors, duplication ratio, distinct values).

    The duplication ratio follows the paper: the fraction of erroneous
    records located at the same exact coordinates as some record that is
    correct for that attribute.
    """
    out = []
    for a in attrs:
        truth = pdf[f"{a.name}__truth"]
        obs = pdf[a.name]
        is_err = obs.isna() | (obs != truth)
        correct_locs = set(
            zip(pdf.loc[~is_err, "lat"], pdf.loc[~is_err, "lon"])
        )
        err_rows = pdf[is_err]
        n_err = int(is_err.sum())
        dup = (
            sum((la, lo) in correct_locs for la, lo in zip(err_rows["lat"], err_rows["lon"]))
            / n_err
            if n_err
            else 0.0
        )
        out.append(
            AttrStats(
                name=a.name,
                records=len(pdf),
                errors=n_err,
                dup_ratio=round(dup, 3),
                distinct=int(truth.nunique()),
            )
        )
    return out
