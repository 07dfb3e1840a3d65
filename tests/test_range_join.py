"""Range self-join against the DuckDB oracle and invariants."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent
from repro.spatial.join import DIST, compute_extent, self_exact_join, self_range_join
from tests._utils import equirect_sql, haversine_sql, pairs_set, rand_points


class TestAgainstOracle:
    @pytest.mark.parametrize("d", [150.0, 600.0, 2500.0])
    def test_equirect_matches_duckdb(self, spark, d):
        pdf = rand_points(180, seed=10)
        sdf = spark.createDataFrame(pdf)
        ext = compute_extent(sdf, "lat", "lon")
        got = self_range_join(sdf, d_m=d, distance="equirect")
        sql = f"""
            SELECT a.rid AS r1, b.rid AS r2, {equirect_sql(ext.ref_lat)} AS dist_m
            FROM pts a JOIN pts b ON a.rid <> b.rid
            WHERE {equirect_sql(ext.ref_lat)} < {d!r}
        """
        assert_equivalent(got, sql, pts=pdf)

    @pytest.mark.parametrize("d", [300.0, 1500.0])
    def test_haversine_matches_duckdb(self, spark, d):
        pdf = rand_points(120, seed=11)
        got = self_range_join(spark.createDataFrame(pdf), d_m=d, distance="haversine")
        sql = f"""
            SELECT a.rid AS r1, b.rid AS r2, {haversine_sql()} AS dist_m
            FROM pts a JOIN pts b ON a.rid <> b.rid
            WHERE {haversine_sql()} < {d!r}
        """
        assert_equivalent(got, sql, pts=pdf)


class TestInvariants:
    @pytest.fixture(scope="class")
    def joined(self, spark):
        pdf = rand_points(200, seed=12)
        out = self_range_join(spark.createDataFrame(pdf), d_m=800.0).toPandas()
        return pdf, out

    def test_symmetric(self, joined):
        _, out = joined
        pairs = set(zip(out["r1"], out["r2"]))
        assert pairs == {(b, a) for a, b in pairs}

    def test_no_self_pairs(self, joined):
        _, out = joined
        assert (out["r1"] != out["r2"]).all()

    def test_strictly_below_d(self, joined):
        _, out = joined
        assert (out[DIST] < 800.0).all()
        assert (out[DIST] >= 0.0).all()

    def test_nonempty_at_this_density(self, joined):
        _, out = joined
        assert len(out) > 0

    def test_tiny_radius_yields_empty(self, spark):
        pdf = rand_points(60, seed=13)
        assert self_range_join(spark.createDataFrame(pdf), d_m=0.5).count() == 0

    def test_duplicate_locations_pair_at_zero(self, spark):
        pdf = rand_points(5, seed=14)
        dup = pdf.copy()
        dup["rid"] = dup["rid"] + 100
        both = spark.createDataFrame(
            __import__("pandas").concat([pdf, dup], ignore_index=True)
        )
        out = self_range_join(both, d_m=50.0).toPandas()
        zero = out[out[DIST] == 0.0]
        assert pairs_set(zero) >= {(i, i + 100) for i in range(5)}

    def test_custom_column_names(self, spark):
        pdf = rand_points(40, seed=15).rename(
            columns={"rid": "id", "lat": "latitude", "lon": "longitude"}
        )
        out = self_range_join(
            spark.createDataFrame(pdf),
            d_m=1000.0, id_col="id", lat_col="latitude", lon_col="longitude",
        )
        assert set(out.columns) == {"r1", "r2", DIST}

    def test_precomputed_extent_gives_same_result(self, spark):
        pdf = rand_points(80, seed=16)
        sdf = spark.createDataFrame(pdf)
        ext = compute_extent(sdf, "lat", "lon")
        a = self_range_join(sdf, d_m=700.0).toPandas()
        b = self_range_join(sdf, d_m=700.0, extent=ext).toPandas()
        assert pairs_set(a) == pairs_set(b)


class TestExactJoin:
    def test_only_exact_duplicates(self, spark):
        pdf = rand_points(30, seed=17)
        pdf.loc[1, ["lat", "lon"]] = pdf.loc[0, ["lat", "lon"]].values
        pdf.loc[2, ["lat", "lon"]] = pdf.loc[0, ["lat", "lon"]].values
        out = self_exact_join(spark.createDataFrame(pdf)).toPandas()
        assert pairs_set(out) == {
            (0, 1), (1, 0), (0, 2), (2, 0), (1, 2), (2, 1)
        }
        assert (out[DIST] == 0.0).all()

    def test_no_duplicates_empty(self, spark):
        out = self_exact_join(spark.createDataFrame(rand_points(25, seed=18)))
        assert out.count() == 0

    def test_matches_duckdb(self, spark):
        pdf = rand_points(40, seed=19)
        pdf.loc[5:9, "lat"] = pdf.loc[0, "lat"]
        pdf.loc[5:9, "lon"] = pdf.loc[0, "lon"]
        got = self_exact_join(spark.createDataFrame(pdf))
        sql = """
            SELECT a.rid AS r1, b.rid AS r2, 0.0 AS dist_m
            FROM pts a JOIN pts b
              ON a.lat = b.lat AND a.lon = b.lon AND a.rid <> b.rid
        """
        assert_equivalent(got, sql, pts=pdf)


class TestExtent:
    def test_fields(self, spark):
        pdf = rand_points(50, seed=20)
        ext = compute_extent(spark.createDataFrame(pdf), "lat", "lon")
        assert ext.n == 50
        assert ext.lat_min == pytest.approx(pdf["lat"].min())
        assert ext.lat_max == pytest.approx(pdf["lat"].max())
        assert ext.width_m > 0 and ext.height_m > 0
        assert ext.diagonal_m == pytest.approx(
            np.hypot(ext.width_m, ext.height_m)
        )

    def test_empty_input(self, spark):
        empty = spark.createDataFrame([], schema="rid long, lat double, lon double")
        ext = compute_extent(empty, "lat", "lon")
        assert ext.n == 0
        assert self_range_join(empty, d_m=100.0, extent=ext).count() == 0
