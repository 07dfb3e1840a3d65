"""End-to-end Sparcle pipeline vs the exact-location host baseline."""
import pandas as pd
import pytest

from repro.core.constraints import (
    ExactLocationConstraint,
    SpatialKNNConstraint,
    SpatialRangeConstraint,
    WeightFunction,
)
from repro.core.pipeline import host_baseline_clean, sparcle_clean
from repro.evalx.metrics import duplication_split, evaluate_repairs
from repro.synth_spatial import BBOX_CHICAGO, RegionAttr, spatial_dataset_pdf

ATTR = RegionAttr("ward", 8, error_rate=0.12, dup_ratio=0.4, missing_frac=0.5)
D_M = 1800.0  # ~40 expected neighbors at n=1000 over the Chicago bbox


@pytest.fixture(scope="module")
def data(spark):
    pdf = spatial_dataset_pdf(n=1000, attrs=[ATTR], bbox=BBOX_CHICAGO, seed=21)
    sdf = spark.createDataFrame(pdf[["rid", "lat", "lon", "ward"]])
    return pdf, sdf


@pytest.fixture(scope="module")
def sparcle_out(data):
    _, sdf = data
    return sparcle_clean(
        sdf, SpatialRangeConstraint("ward", D_M, WeightFunction(n=2.0)),
        corrector="aimnet",
    )


@pytest.fixture(scope="module")
def baseline_out(data):
    _, sdf = data
    return host_baseline_clean(sdf, "ward", corrector="aimnet")


def _metrics(pdf, out):
    repairs = out.repairs.select("rid", "new_value").toPandas()
    return evaluate_repairs(pdf, repairs, attribute="ward")


class TestSparcleEndToEnd:
    def test_substantially_cleans(self, data, sparcle_out):
        pdf, _ = data
        m = _metrics(pdf, sparcle_out)
        assert m.recall > 0.8 and m.f1 > 0.7

    def test_beats_host_baseline(self, data, sparcle_out, baseline_out):
        pdf, _ = data
        assert _metrics(pdf, sparcle_out).f1 > _metrics(pdf, baseline_out).f1 + 0.2

    def test_repairs_listed_are_changes_only(self, sparcle_out):
        rep = sparcle_out.repairs.toPandas()
        changed = rep["new_value"].notna() & (
            rep["old_value"].isna() | (rep["old_value"] != rep["new_value"])
        )
        assert changed.all()

    def test_repaired_df_consistent_with_repairs(self, data, sparcle_out):
        pdf, _ = data
        rep = sparcle_out.repairs.toPandas().set_index("rid")["new_value"]
        out = sparcle_out.repaired_df.toPandas().set_index("rid")["ward"]
        for rid, newv in rep.items():
            assert out[rid] == newv
        untouched = pdf[~pdf["rid"].isin(rep.index)].set_index("rid")
        got = out[untouched.index]
        assert (
            (got == untouched["ward"]) | (got.isna() & untouched["ward"].isna())
        ).all()

    def test_diagnostics_keys(self, sparcle_out):
        d = sparcle_out.diagnostics
        assert {
            "n_records", "n_pairs", "n_detected_errors", "n_labeled",
            "n_repaired", "elapsed_s",
        } <= set(d)
        assert d["n_records"] == 1000 and d["n_pairs"] > 0


class TestBaselineBehaviour:
    def test_baseline_fixes_duplicated_not_new(self, data, baseline_out):
        """The paper's Table 1 mechanism: exact co-occurrence repairs
        duplicated-location errors but almost none at new locations."""
        pdf, _ = data
        repairs = baseline_out.repairs.select("rid", "new_value").toPandas()
        s = duplication_split(pdf, repairs, attribute="ward")
        assert s.duplicated_recall > 0.8
        assert s.new_location_recall < 0.1
        assert s.n_duplicated > 0 and s.n_new > 0

    def test_sparcle_fixes_both(self, data, sparcle_out):
        pdf, _ = data
        repairs = sparcle_out.repairs.select("rid", "new_value").toPandas()
        s = duplication_split(pdf, repairs, attribute="ward")
        assert s.duplicated_recall > 0.8
        assert s.new_location_recall > 0.8

    def test_d_zero_range_equals_exact_baseline(self, data, baseline_out):
        _, sdf = data
        via_zero = sparcle_clean(
            sdf, SpatialRangeConstraint("ward", 0.0), corrector="aimnet"
        )
        a = via_zero.repairs.select("rid", "new_value").toPandas()
        b = baseline_out.repairs.select("rid", "new_value").toPandas()
        key = lambda p: sorted(map(tuple, p.fillna("∅").values))
        assert key(a) == key(b)


class TestVariants:
    @pytest.mark.parametrize("corrector", ["holoclean", "baran"])
    def test_other_correctors_also_clean(self, data, corrector):
        pdf, sdf = data
        out = sparcle_clean(
            sdf, SpatialRangeConstraint("ward", D_M, WeightFunction(n=2.0)),
            corrector=corrector,
        )
        m = _metrics(pdf, out)
        assert m.recall > 0.7

    def test_unknown_corrector_raises(self, data):
        _, sdf = data
        with pytest.raises(ValueError, match="corrector"):
            sparcle_clean(sdf, SpatialRangeConstraint("ward", D_M), corrector="nope")

    def test_knn_constraint_end_to_end(self, data):
        pdf, sdf = data
        out = sparcle_clean(
            sdf, SpatialKNNConstraint("ward", k=20), corrector="aimnet"
        )
        m = _metrics(pdf, out)
        assert m.recall > 0.7

    def test_n0_ablation_runs_and_cleans(self, data):
        pdf, sdf = data
        out = sparcle_clean(
            sdf, SpatialRangeConstraint("ward", D_M, WeightFunction(n=0.0)),
            corrector="aimnet",
        )
        m = _metrics(pdf, out)
        assert m.recall > 0.6

    def test_exact_constraint_object_directly(self, data, baseline_out):
        _, sdf = data
        out = sparcle_clean(sdf, ExactLocationConstraint("ward"), corrector="aimnet")
        a = out.repairs.select("rid", "new_value").toPandas()
        b = baseline_out.repairs.select("rid", "new_value").toPandas()
        key = lambda p: sorted(map(tuple, p.fillna("∅").values))
        assert key(a) == key(b)
