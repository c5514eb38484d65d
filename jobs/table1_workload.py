"""Reproduce Table 1: RelatedQS workload characteristics — template
share per temporal split t0..t3 and fraction of feasible KG entities.

Usage: spark-submit jobs/table1_workload.py [--scale bench|test]
"""
from _common import parse_scale

from repro.kg.entities import kg_entities
from repro.kg.table1 import format_table1, workload_characteristics
from repro.kg.workload import relatedqs_workload


def main() -> None:
    scale = parse_scale(__doc__)
    ds = kg_entities(n=scale.kg_n, dim=scale.kg_dim, seed=0)
    splits = relatedqs_workload(
        ds, n_queries_per_split=scale.relatedqs_per_split, seed=0
    )
    print("Table 1 (reproduction): RelatedQS-lite workload characteristics")
    print(format_table1(workload_characteristics(ds, splits)))


if __name__ == "__main__":
    main()
