"""Tests for the exact (ground-truth) polygon aggregation, including a
DuckDB cross-check of the ray-casting membership predicate."""
import duckdb
import numpy as np
import pytest

from repro.exact import exact_aggregates, exact_mask, relative_count_error
from repro.s2lite.polygon import Polygon
from repro.synth_data import nyc_taxi_pandas

TAXI = nyc_taxi_pandas(sf=0.002)
MIDTOWN = Polygon(
    [(-74.00, 40.74), (-73.96, 40.74), (-73.96, 40.77), (-74.00, 40.77)]
)


def test_exact_mask_matches_rectangle_semantics():
    m = exact_mask(TAXI, MIDTOWN)
    ref = (
        TAXI["dropoff_lon"].between(-74.00, -73.96)
        & TAXI["dropoff_lat"].between(40.74, 40.77)
    ).to_numpy()
    # Ray casting on an axis-aligned rectangle differs from closed-interval
    # semantics only on the boundary (measure zero for random points).
    assert (m == ref).mean() > 0.9999


def test_exact_aggregates_values():
    specs = [
        ("passenger_count", "sum"),
        ("passenger_count", "count"),
        ("trip_distance", "min"),
        ("trip_distance", "max"),
        ("dropoff_ts", "avg"),
    ]
    res = exact_aggregates(TAXI, MIDTOWN, specs)
    sub = TAXI.loc[exact_mask(TAXI, MIDTOWN)]
    assert res[("passenger_count", "count")] == len(sub)
    assert res[("passenger_count", "sum")] == pytest.approx(sub["passenger_count"].sum())
    assert res[("trip_distance", "min")] == pytest.approx(sub["trip_distance"].min())
    assert res[("trip_distance", "max")] == pytest.approx(sub["trip_distance"].max())
    assert res[("dropoff_ts", "avg")] == pytest.approx(sub["dropoff_ts"].mean())


def test_exact_aggregates_empty_region():
    nowhere = Polygon([(0, 0), (0.001, 0), (0.001, 0.001), (0, 0.001)])
    res = exact_aggregates(
        TAXI, nowhere, [("trip_distance", "min"), ("trip_distance", "sum"), ("trip_distance", "count")]
    )
    assert res[("trip_distance", "count")] == 0
    assert res[("trip_distance", "sum")] == 0.0
    assert res[("trip_distance", "min")] is None


def test_exact_aggregates_rejects_unknown_op():
    with pytest.raises(ValueError):
        exact_aggregates(TAXI, MIDTOWN, [("trip_distance", "median")])


def test_relative_count_error():
    assert relative_count_error(110, 100) == pytest.approx(0.1)
    assert relative_count_error(0, 0) == 0.0
    assert relative_count_error(5, 0) == float("inf")


def test_exact_mask_against_duckdb_rectangle():
    """Cross-check counts against DuckDB SQL over the same frame."""
    con = duckdb.connect()
    con.register("taxi", TAXI)
    exp = con.execute(
        "SELECT count(*) FROM taxi WHERE dropoff_lon BETWEEN -74.00 AND -73.96 "
        "AND dropoff_lat BETWEEN 40.74 AND 40.77"
    ).fetchone()[0]
    con.close()
    got = int(exact_mask(TAXI, MIDTOWN).sum())
    assert got == pytest.approx(exp, abs=2)  # boundary-point slack
