"""Distributed-dataflow comparison (repro-band target): answer the
neighborhood workload from pre-aggregated CellBlock headers vs
on-the-fly from raw points, both as Catalyst broadcast range joins."""
from _session import bench_sf, get_spark

from repro.experiments import distributed_compare, print_table


def main():
    spark = get_spark("geoblocks-distributed-compare")
    try:
        rows = distributed_compare(spark, sf=bench_sf())
        print_table(rows, title="Distributed: pre-aggregated headers vs on-the-fly")
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
