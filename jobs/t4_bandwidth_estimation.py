"""T4 / Figure 13: estimated vs theoretical bandwidth (driver-side)."""
from repro.experiments import tables
from repro.experiments.harness import format_rows


def main():
    rows = tables.t4_bandwidth_estimation()
    print("\n=== t4_bandwidth_estimation ===")
    print(format_rows(rows))
    return rows


if __name__ == "__main__":
    main()
