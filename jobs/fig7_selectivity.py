"""Reproduce Figure 7: query runtime at varying selectivity for every
engine (Blocks V1/V2, BinarySearch, BTree, PHTree, RTree)."""
from _session import bench_sf

from repro.experiments import fig7_selectivity, print_table


def main():
    rows = fig7_selectivity(sf=bench_sf())
    print_table(rows, title="Figure 7 — query runtime at varying selectivity")


if __name__ == "__main__":
    main()
