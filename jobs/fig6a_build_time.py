"""Reproduce Figure 6a: build time of the GeoBlock and every baseline."""
from _session import bench_sf

from repro.experiments import fig6a_build_times, print_table


def main():
    rows = fig6a_build_times(sf=bench_sf())
    print_table(rows, title="Figure 6a — build time of GeoBlock and baselines")


if __name__ == "__main__":
    main()
