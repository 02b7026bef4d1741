"""Tests for the synthetic NYC taxi generator."""
import numpy as np
import pytest

from repro.synth_data import NYC_BBOX, NYC_HOTSPOTS, nyc_taxi, nyc_taxi_pandas


def test_schema_and_types():
    df = nyc_taxi_pandas(sf=0.001)
    assert list(df.columns) == [
        "dropoff_lon",
        "dropoff_lat",
        "dropoff_ts",
        "passenger_count",
        "trip_distance",
    ]
    assert df["dropoff_ts"].dtype == np.int64
    assert df["passenger_count"].dtype == np.int64
    assert df["trip_distance"].dtype == np.float64


def test_row_count_scales_with_sf():
    assert len(nyc_taxi_pandas(sf=0.001)) == 12_000
    assert len(nyc_taxi_pandas(sf=0.01)) == 120_000


def test_deterministic_in_seed():
    a = nyc_taxi_pandas(sf=0.001, seed=7)
    b = nyc_taxi_pandas(sf=0.001, seed=7)
    assert a.equals(b)
    c = nyc_taxi_pandas(sf=0.001, seed=8)
    assert not a.equals(c)


def test_all_points_inside_bbox():
    df = nyc_taxi_pandas(sf=0.005)
    lon_lo, lat_lo, lon_hi, lat_hi = NYC_BBOX
    assert df["dropoff_lon"].between(lon_lo, lon_hi).all()
    assert df["dropoff_lat"].between(lat_lo, lat_hi).all()


def test_value_ranges():
    df = nyc_taxi_pandas(sf=0.005)
    assert df["passenger_count"].between(1, 6).all()
    assert (df["trip_distance"] > 0).all()
    ts = df["dropoff_ts"]
    import pandas as pd

    assert ts.min() >= pd.Timestamp("2015-01-01").timestamp()
    assert ts.max() < pd.Timestamp("2015-04-01").timestamp()


def test_manhattan_skew():
    """The generator must reproduce the paper's spatial skew: the
    Manhattan core holds far more than its area share of drop-offs."""
    df = nyc_taxi_pandas(sf=0.01)
    core = (
        df["dropoff_lon"].between(-74.03, -73.92)
        & df["dropoff_lat"].between(40.69, 40.82)
    )
    lon_lo, lat_lo, lon_hi, lat_hi = NYC_BBOX
    area_share = (0.11 * 0.13) / ((lon_hi - lon_lo) * (lat_hi - lat_lo))
    assert core.mean() > 4 * area_share
    assert core.mean() > 0.5


def test_hotspot_weights_sum_sensible():
    w = sum(w for *_, w in NYC_HOTSPOTS)
    assert 0.8 < w <= 1.0


def test_spark_frame_matches_pandas(spark):
    sdf = nyc_taxi(spark, sf=0.001)
    assert sdf.count() == 12_000
    assert set(sdf.columns) == set(nyc_taxi_pandas(sf=0.001).columns)
