"""Reproduce Figure 8: relative error & query runtime vs block level."""
from _session import bench_sf

from repro.experiments import fig8_level_error, print_table


def main():
    rows = fig8_level_error(sf=bench_sf())
    print_table(rows, title="Figure 8 — relative error & runtime at varying levels")


if __name__ == "__main__":
    main()
