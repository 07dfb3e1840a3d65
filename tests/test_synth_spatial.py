"""Voronoi-region dataset generator: rates, duplication, determinism."""
import numpy as np
import pandas as pd
import pytest

from repro.synth_spatial import (
    BBOX_CHICAGO,
    BBOX_NYC,
    RegionAttr,
    dataset_stats,
    spatial_dataset,
    spatial_dataset_pdf,
)

WARD = RegionAttr("ward", 12, error_rate=0.2, dup_ratio=0.5, missing_frac=0.5)


@pytest.fixture(scope="module")
def pdf():
    return spatial_dataset_pdf(n=2000, attrs=[WARD], bbox=BBOX_CHICAGO, seed=42)


class TestShape:
    def test_columns(self, pdf):
        assert list(pdf.columns) == ["rid", "lat", "lon", "ward", "ward__truth"]

    def test_row_count_and_unique_ids(self, pdf):
        assert len(pdf) == 2000
        assert pdf["rid"].is_unique

    def test_bbox_containment(self, pdf):
        lat_min, lat_max, lon_min, lon_max = BBOX_CHICAGO
        assert pdf["lat"].between(lat_min, lat_max).all()
        assert pdf["lon"].between(lon_min, lon_max).all()

    def test_truth_never_null(self, pdf):
        assert pdf["ward__truth"].notna().all()

    def test_spark_view_matches(self, spark):
        sdf = spatial_dataset(spark, n=300, attrs=[WARD], bbox=BBOX_CHICAGO, seed=1)
        back = sdf.toPandas().sort_values("rid").reset_index(drop=True)
        direct = spatial_dataset_pdf(n=300, attrs=[WARD], bbox=BBOX_CHICAGO, seed=1)
        pd.testing.assert_frame_equal(back, direct)


class TestErrors:
    def test_error_count_exact(self, pdf):
        is_err = pdf["ward"].isna() | (pdf["ward"] != pdf["ward__truth"])
        assert int(is_err.sum()) == 400  # 0.2 × 2000

    def test_non_errors_match_truth(self, pdf):
        is_err = pdf["ward"].isna() | (pdf["ward"] != pdf["ward__truth"])
        ok = pdf[~is_err]
        assert (ok["ward"] == ok["ward__truth"]).all()

    def test_missing_fraction_roughly_half(self, pdf):
        is_err = pdf["ward"].isna() | (pdf["ward"] != pdf["ward__truth"])
        n_null = int(pdf["ward"].isna().sum())
        assert 0.35 * 400 <= n_null <= 0.65 * 400

    def test_wrong_values_are_valid_labels(self, pdf):
        wrong = pdf[pdf["ward"].notna() & (pdf["ward"] != pdf["ward__truth"])]
        labels = {f"ward_{i}" for i in range(12)}
        assert set(wrong["ward"]).issubset(labels)

    def test_zero_error_rate_not_allowed_but_tiny_ok(self):
        pdf = spatial_dataset_pdf(
            n=500,
            attrs=[RegionAttr("w", 5, error_rate=0.0)],
            bbox=BBOX_CHICAGO,
            seed=3,
        )
        assert (pdf["w"] == pdf["w__truth"]).all()


class TestDuplication:
    def test_dup_ratio_measured(self, pdf):
        (st,) = dataset_stats(pdf, [WARD])
        assert st.dup_ratio == pytest.approx(0.5, abs=0.05)

    def test_duplicated_errors_share_location_with_clean_record(self, pdf):
        is_err = pdf["ward"].isna() | (pdf["ward"] != pdf["ward__truth"])
        clean_locs = set(zip(pdf.loc[~is_err, "lat"], pdf.loc[~is_err, "lon"]))
        dup_errs = [
            (la, lo)
            for la, lo in zip(pdf.loc[is_err, "lat"], pdf.loc[is_err, "lon"])
            if (la, lo) in clean_locs
        ]
        assert len(dup_errs) == pytest.approx(200, abs=20)

    def test_zero_dup_ratio_unique_locations(self):
        pdf = spatial_dataset_pdf(
            n=1000,
            attrs=[RegionAttr("w", 8, error_rate=0.1, dup_ratio=0.0)],
            bbox=BBOX_NYC,
            seed=5,
        )
        (st,) = dataset_stats(pdf, [RegionAttr("w", 8, error_rate=0.1)])
        assert st.dup_ratio == 0.0
        assert not pdf.duplicated(subset=["lat", "lon"]).any()


class TestDeterminism:
    def test_same_seed_same_data(self):
        a = spatial_dataset_pdf(n=400, attrs=[WARD], bbox=BBOX_CHICAGO, seed=9)
        b = spatial_dataset_pdf(n=400, attrs=[WARD], bbox=BBOX_CHICAGO, seed=9)
        pd.testing.assert_frame_equal(a, b)

    def test_different_seed_different_data(self):
        a = spatial_dataset_pdf(n=400, attrs=[WARD], bbox=BBOX_CHICAGO, seed=9)
        b = spatial_dataset_pdf(n=400, attrs=[WARD], bbox=BBOX_CHICAGO, seed=10)
        assert not a.equals(b)


class TestMultiAttribute:
    ATTRS = [
        RegionAttr("big", 6, error_rate=0.30, dup_ratio=0.0),
        RegionAttr("small", 40, error_rate=0.10, dup_ratio=0.0),
    ]

    @pytest.fixture(scope="class")
    def multi(self):
        return spatial_dataset_pdf(n=3000, attrs=self.ATTRS, bbox=BBOX_CHICAGO, seed=11)

    def test_independent_truth_columns(self, multi):
        assert multi["big__truth"].nunique() == 6
        assert 30 <= multi["small__truth"].nunique() <= 40

    def test_error_sets_are_nested_prefixes(self, multi):
        err_small = set(
            multi.loc[
                multi["small"].isna() | (multi["small"] != multi["small__truth"]), "rid"
            ]
        )
        err_big = set(
            multi.loc[
                multi["big"].isna() | (multi["big"] != multi["big__truth"]), "rid"
            ]
        )
        assert err_small <= err_big  # 10% prefix ⊆ 30% prefix

    def test_stats_per_attr(self, multi):
        stats = {s.name: s for s in dataset_stats(multi, self.ATTRS)}
        assert stats["big"].errors == 900
        assert stats["small"].errors == 300
        assert stats["big"].distinct == 6


class TestValidation:
    def test_bad_rates_raise(self):
        with pytest.raises(ValueError, match="rates"):
            RegionAttr("w", 5, error_rate=1.5)

    def test_too_few_regions_raise(self):
        with pytest.raises(ValueError, match="regions"):
            RegionAttr("w", 1, error_rate=0.1)

    def test_dup_without_clean_records_raises(self):
        with pytest.raises(ValueError, match="fully-clean"):
            spatial_dataset_pdf(
                n=100,
                attrs=[RegionAttr("w", 5, error_rate=1.0, dup_ratio=0.5)],
                bbox=BBOX_CHICAGO,
                seed=1,
            )
