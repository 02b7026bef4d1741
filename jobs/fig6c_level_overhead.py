"""Reproduce Figure 6c: level influence on GeoBlock build time/size."""
from _session import bench_sf

from repro.experiments import fig6c_level_overhead, print_table


def main():
    rows = fig6c_level_overhead(sf=bench_sf())
    print_table(rows, title="Figure 6c — level influence on GeoBlock overhead")


if __name__ == "__main__":
    main()
