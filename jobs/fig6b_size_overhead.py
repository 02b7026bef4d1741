"""Reproduce Figure 6b: relative size overhead of every algorithm."""
from _session import bench_sf

from repro.experiments import fig6b_size_overhead, print_table


def main():
    rows = fig6b_size_overhead(sf=bench_sf())
    print_table(rows, title="Figure 6b — size overhead of GeoBlock and baselines")


if __name__ == "__main__":
    main()
