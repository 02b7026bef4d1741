"""Distributed-dataflow benchmark (repro-band target): the neighborhood
workload answered from pre-aggregated CellBlock headers vs on-the-fly
from raw points, both as Catalyst broadcast range joins."""
import os

import pytest

from repro.core.build import build_headers_spark, with_spatial_key
from repro.core.spark_query import (
    query_headers_spark,
    query_points_spark,
    ranges_for_polygons,
)
from repro.experiments import DEFAULT_LEVEL
from repro.synth_data import nyc_taxi
from repro.workloads import DEFAULT_AGGS, VALUE_COLS, neighborhoods

BENCH_SF = float(os.environ.get("REPRO_BENCH_SF", "0.1"))
N_POLYS = 40


@pytest.fixture(scope="module")
def dist(spark):
    points = with_spatial_key(nyc_taxi(spark, sf=BENCH_SF)).cache()
    points.count()
    headers = build_headers_spark(points, DEFAULT_LEVEL, VALUE_COLS).cache()
    headers.count()
    ranges = ranges_for_polygons(
        spark, neighborhoods()[:N_POLYS], DEFAULT_LEVEL
    ).cache()
    ranges.count()
    return {"points": points, "headers": headers, "ranges": ranges}


def test_preagg_headers_workload(benchmark, dist):
    benchmark.pedantic(
        lambda: query_headers_spark(dist["headers"], dist["ranges"], DEFAULT_AGGS).collect(),
        rounds=3,
        iterations=1,
        warmup_rounds=1,
    )


def test_on_the_fly_workload(benchmark, dist):
    benchmark.pedantic(
        lambda: query_points_spark(dist["points"], dist["ranges"], DEFAULT_AGGS).collect(),
        rounds=3,
        iterations=1,
        warmup_rounds=1,
    )


def test_distributed_build(benchmark, dist):
    benchmark.pedantic(
        lambda: build_headers_spark(dist["points"], DEFAULT_LEVEL, VALUE_COLS)
        .write.mode("overwrite")
        .format("noop")
        .save(),
        rounds=2,
        iterations=1,
    )
