"""Reproduce Table 1: GeoBlock sorting/building times at levels 13-21."""
from _session import bench_sf

from repro.experiments import print_table, table1_build_times


def main():
    rows = table1_build_times(sf=bench_sf())
    print_table(rows, title="Table 1 — index build times (ms) at varying GeoBlock levels")


if __name__ == "__main__":
    main()
