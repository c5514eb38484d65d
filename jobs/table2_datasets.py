"""Reproduce Table 2: the evaluation datasets at reproduction scale.

Usage: spark-submit jobs/table2_datasets.py [--scale bench|test]
"""
from _common import parse_scale

from repro.bench.report import format_table2


def main() -> None:
    scale = parse_scale(__doc__)
    print("Table 2 (reproduction): evaluation datasets")
    print(format_table2(scale))


if __name__ == "__main__":
    main()
