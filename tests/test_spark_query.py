"""Tests for the distributed polygon-query paths.

The pre-aggregated (header) path and the on-the-fly (raw point) path
must agree with each other and with DuckDB running the same range-join
SQL — this is the correctness core of the `distributed_dataflow` repro
target.
"""
import pytest

from repro.core.build import build_headers_spark, with_spatial_key
from repro.core.spark_query import (
    agg_aliases,
    query_headers_spark,
    query_points_spark,
    ranges_for_polygons,
)
from repro.oracle import assert_equivalent
from repro.synth_data import nyc_taxi
from repro.workloads import DEFAULT_AGGS, VALUE_COLS, neighborhoods

SF = 0.002
LEVEL = 14
N_POLYS = 12


@pytest.fixture(scope="module")
def taxi_sdf(spark):
    return with_spatial_key(nyc_taxi(spark, sf=SF)).cache()


@pytest.fixture(scope="module")
def headers(taxi_sdf):
    return build_headers_spark(taxi_sdf, LEVEL, VALUE_COLS).cache()


@pytest.fixture(scope="module")
def ranges(spark):
    return ranges_for_polygons(spark, neighborhoods()[:N_POLYS], LEVEL).cache()


def _ontfly_sql(specs):
    exprs = []
    for col, op in specs:
        name = f"{col}_{op}"
        if op == "count":
            exprs.append(f"count(*) AS {name}")
        else:
            exprs.append(f"{op}({col}) AS {name}")
    return (
        "SELECT r.qid AS qid, " + ", ".join(exprs)
        + " FROM taxi t JOIN ranges r ON t.skey BETWEEN r.rmin AND r.rmax"
        + " GROUP BY r.qid"
    )


def test_ranges_relation_shape(spark):
    r = ranges_for_polygons(spark, neighborhoods()[:3], LEVEL)
    pdf = r.toPandas()
    assert set(pdf.columns) == {"qid", "rmin", "rmax"}
    assert set(pdf["qid"]) == {0, 1, 2}
    assert (pdf["rmin"] <= pdf["rmax"]).all()


def test_on_the_fly_against_duckdb(taxi_sdf, ranges):
    res = query_points_spark(taxi_sdf, ranges, DEFAULT_AGGS)
    assert_equivalent(res, _ontfly_sql(DEFAULT_AGGS), taxi=taxi_sdf, ranges=ranges)


def test_preagg_matches_on_the_fly(taxi_sdf, headers, ranges):
    """GeoBlocks headers and raw-point aggregation answer identically
    (both are exact w.r.t. the covering cells)."""
    a = query_headers_spark(headers, ranges, DEFAULT_AGGS).toPandas()
    b = query_points_spark(taxi_sdf, ranges, DEFAULT_AGGS).toPandas()
    assert len(a) == len(b)
    for name in agg_aliases(DEFAULT_AGGS):
        assert a[name].to_numpy() == pytest.approx(b[name].to_numpy(), rel=1e-9)


def test_preagg_against_duckdb(headers, ranges, taxi_sdf):
    res = query_headers_spark(headers, ranges, DEFAULT_AGGS)
    assert_equivalent(res, _ontfly_sql(DEFAULT_AGGS), taxi=taxi_sdf, ranges=ranges)


def test_avg_aggregate_supported(taxi_sdf, headers, ranges):
    specs = [("trip_distance", "avg"), ("trip_distance", "count")]
    a = query_headers_spark(headers, ranges, specs).toPandas()
    b = query_points_spark(taxi_sdf, ranges, specs).toPandas()
    assert a["trip_distance_avg"].to_numpy() == pytest.approx(
        b["trip_distance_avg"].to_numpy(), rel=1e-9
    )


def test_unknown_op_rejected(headers, ranges, taxi_sdf):
    with pytest.raises(ValueError):
        query_headers_spark(headers, ranges, [("trip_distance", "median")])


def test_preagg_touches_fewer_rows(taxi_sdf, headers):
    """The point of pre-aggregation: the header relation is much smaller
    than the raw relation."""
    assert headers.count() < taxi_sdf.count() / 5


def test_matches_driver_engine(taxi_sdf, headers, ranges, spark):
    """Distributed answers equal the driver-side GeoBlock answers."""
    from repro.core.build import geoblock_from_spark

    blk = geoblock_from_spark(taxi_sdf, LEVEL, VALUE_COLS)
    dist = query_headers_spark(headers, ranges, DEFAULT_AGGS).toPandas().set_index("qid")
    polys = neighborhoods()[:N_POLYS]
    for qid, poly in enumerate(polys):
        local = blk.query_select(poly, DEFAULT_AGGS)
        if qid not in dist.index:
            assert local[("passenger_count", "count")] == 0
            continue
        row = dist.loc[qid]
        for col, op in DEFAULT_AGGS:
            assert row[f"{col}_{op}"] == pytest.approx(local[(col, op)], rel=1e-9)
