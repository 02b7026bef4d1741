"""Reproduce Figure 1: combined-workload runtime vs number of queried
aggregates for BinarySearch, BTree, Blocks V1 and Blocks V2."""
from _session import bench_sf

from repro.experiments import fig1_aggregates, print_table


def main():
    rows = fig1_aggregates(sf=bench_sf())
    print_table(rows, title="Figure 1 — runtime with increasing number of aggregates")


if __name__ == "__main__":
    main()
