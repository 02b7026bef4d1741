"""Reproduce Figure 10: AggregateTrie threshold influence on the base
and skewed workload runtimes."""
from _session import bench_sf

from repro.experiments import fig10_threshold, print_table


def main():
    rows = fig10_threshold(sf=bench_sf())
    print_table(rows, title="Figure 10 — threshold influence on workload runtime")


if __name__ == "__main__":
    main()
