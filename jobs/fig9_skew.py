"""Reproduce Figure 9: base/skew workload runtime vs workload skew for
the non-adaptive (V1) and adaptive (V2) GeoBlock."""
from _session import bench_sf

from repro.experiments import fig9_skew, print_table


def main():
    rows = fig9_skew(sf=bench_sf())
    print_table(rows, title="Figure 9 — query runtime with increasing workload skew")


if __name__ == "__main__":
    main()
