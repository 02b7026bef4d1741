"""Synthetic OLAP data at a configurable scale factor.

SF=1.0 is roughly TPC-H SF1 (~1 GB across tables). Tests use SF<=0.01;
benchmarks use SF~=0.1. Generators are deterministic in ``seed`` so the
DuckDB oracle sees identical input.
"""
import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

_N_LINEITEM_PER_SF = 6_000_000
_N_ORDERS_PER_SF = 1_500_000
_N_CUSTOMER_PER_SF = 150_000
_N_PART_PER_SF = 200_000


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def lineitem(spark: SparkSession, *, sf: float = 0.01, seed: int = 0) -> DataFrame:
    n = max(1, int(_N_LINEITEM_PER_SF * sf))
    n_orders = max(1, int(_N_ORDERS_PER_SF * sf))
    n_part = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "l_orderkey": g.integers(1, n_orders + 1, n),
            "l_partkey": g.integers(1, n_part + 1, n),
            "l_linenumber": g.integers(1, 8, n),
            "l_quantity": g.integers(1, 51, n).astype("float64"),
            "l_extendedprice": (g.random(n) * 90000 + 900).round(2),
            "l_discount": (g.random(n) * 0.1).round(2),
            "l_tax": (g.random(n) * 0.08).round(2),
            "l_returnflag": g.choice(list("NRA"), n),
            "l_linestatus": g.choice(list("OF"), n),
            "l_shipdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2557, n), unit="D"),
        }
    )
    return spark.createDataFrame(pdf)


def orders(spark: SparkSession, *, sf: float = 0.01, seed: int = 1) -> DataFrame:
    n = max(1, int(_N_ORDERS_PER_SF * sf))
    n_cust = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "o_orderkey": np.arange(1, n + 1),
            "o_custkey": g.integers(1, n_cust + 1, n),
            "o_orderstatus": g.choice(list("OFP"), n),
            "o_totalprice": (g.random(n) * 500000 + 1000).round(2),
            "o_orderdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2406, n), unit="D"),
            "o_orderpriority": g.choice(
                ["1-URGENT", "2-HIGH", "3-MEDIUM", "4-NOT", "5-LOW"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def part(spark: SparkSession, *, sf: float = 0.01, seed: int = 5) -> DataFrame:
    n = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "p_partkey": np.arange(1, n + 1),
            "p_type": g.choice(
                ["STANDARD", "SMALL", "MEDIUM", "LARGE", "ECONOMY", "PROMO"], n
            ),
            "p_brand": g.choice([f"Brand#{i}{j}" for i in range(1, 6) for j in range(1, 6)], n),
            "p_size": g.integers(1, 51, n),
            "p_retailprice": (900 + (np.arange(1, n + 1) % 1000) / 10.0).round(2),
        }
    )
    return spark.createDataFrame(pdf)


def customer(spark: SparkSession, *, sf: float = 0.01, seed: int = 2) -> DataFrame:
    n = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "c_custkey": np.arange(1, n + 1),
            "c_nationkey": g.integers(0, 25, n),
            "c_acctbal": (g.random(n) * 10000 - 1000).round(2),
            "c_mktsegment": g.choice(
                ["BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


# ---------------------------------------------------------------------------
# NYC taxi (GeoBlocks reproduction)
#
# The paper evaluates on 12 M NYC yellow-cab trips (Jan-Mar 2015, TLC open
# data), using drop-off location as the spatial dimension plus drop-off
# time, passenger count, and trip distance. That dataset is not available
# offline, so we synthesize a drop-in replacement with the same *structure*:
# heavy spatial skew toward Manhattan / the airports (which drives every
# experiment in the paper) and the same column set. SF=1.0 ~ the paper's
# 12 M rows; tests use SF=0.01 (~120 k), benchmarks SF=0.1 (~1.2 M).
# ---------------------------------------------------------------------------

_N_TAXI_PER_SF = 12_000_000

# NYC bounding box used for outlier clipping (the paper "cleared the
# dataset of obvious spatial outliers").
NYC_BBOX = (-74.27, 40.48, -73.68, 40.93)  # lon_lo, lat_lo, lon_hi, lat_hi

# Drop-off hotspots: (lon, lat, sigma_deg, weight). Weights follow the
# skew the paper describes ("focus lies mostly on Manhattan, Brooklyn,
# and the airport regions, ignoring most suburbs").
NYC_HOTSPOTS = [
    (-73.985, 40.750, 0.012, 0.40),  # Midtown Manhattan
    (-74.005, 40.715, 0.010, 0.15),  # Downtown Manhattan
    (-73.950, 40.780, 0.012, 0.10),  # Upper East/West Side
    (-73.950, 40.680, 0.025, 0.15),  # Brooklyn
    (-73.780, 40.645, 0.008, 0.05),  # JFK
    (-73.873, 40.774, 0.006, 0.05),  # LaGuardia
]
_NYC_BACKGROUND_W = 0.10  # uniform over the bbox (suburbs)


def nyc_taxi_pandas(*, sf: float = 0.01, seed: int = 7) -> pd.DataFrame:
    """Synthetic NYC yellow-cab drop-off records as a pandas frame.

    Columns: ``dropoff_lon``, ``dropoff_lat`` (degrees, inside
    ``NYC_BBOX``), ``dropoff_ts`` (int64 epoch seconds, Jan-Mar 2015),
    ``passenger_count`` (int64, 1-6), ``trip_distance`` (float64 miles,
    lognormal). Deterministic in ``seed``.
    """
    n = max(1, int(_N_TAXI_PER_SF * sf))
    g = _rng(seed)
    weights = np.array([w for *_, w in NYC_HOTSPOTS] + [_NYC_BACKGROUND_W])
    weights = weights / weights.sum()
    comp = g.choice(len(weights), size=n, p=weights)
    lon = np.empty(n)
    lat = np.empty(n)
    for i, (clon, clat, sigma, _w) in enumerate(NYC_HOTSPOTS):
        m = comp == i
        k = int(m.sum())
        lon[m] = g.normal(clon, sigma, k)
        lat[m] = g.normal(clat, sigma * 0.75, k)
    m = comp == len(NYC_HOTSPOTS)
    k = int(m.sum())
    lon_lo, lat_lo, lon_hi, lat_hi = NYC_BBOX
    lon[m] = g.uniform(lon_lo, lon_hi, k)
    lat[m] = g.uniform(lat_lo, lat_hi, k)
    # Outlier clipping = the paper's spatial-outlier removal.
    lon = np.clip(lon, lon_lo, lon_hi)
    lat = np.clip(lat, lat_lo, lat_hi)
    t0 = int(pd.Timestamp("2015-01-01").timestamp())
    t1 = int(pd.Timestamp("2015-04-01").timestamp())
    return pd.DataFrame(
        {
            "dropoff_lon": lon,
            "dropoff_lat": lat,
            "dropoff_ts": g.integers(t0, t1, n),
            "passenger_count": g.integers(1, 7, n),
            "trip_distance": np.round(g.lognormal(0.7, 0.8, n), 2),
        }
    )


def nyc_taxi(spark: SparkSession, *, sf: float = 0.01, seed: int = 7) -> DataFrame:
    """Spark DataFrame version of :func:`nyc_taxi_pandas`."""
    return spark.createDataFrame(nyc_taxi_pandas(sf=sf, seed=seed))


def zipf_keys(spark: SparkSession, *, n: int, n_keys: int, alpha: float = 1.1, seed: int = 3) -> DataFrame:
    """Skewed key column — for join-skew / cardinality-estimation papers."""
    g = _rng(seed)
    ranks = np.arange(1, n_keys + 1)
    weights = 1.0 / ranks**alpha
    weights /= weights.sum()
    keys = g.choice(ranks, size=n, p=weights)
    return spark.createDataFrame(pd.DataFrame({"k": keys, "v": g.random(n)}))


def uniform_keys(spark: SparkSession, *, n: int, n_keys: int, seed: int = 4) -> DataFrame:
    g = _rng(seed)
    return spark.createDataFrame(
        pd.DataFrame({"k": g.integers(1, n_keys + 1, n), "v": g.random(n)})
    )
