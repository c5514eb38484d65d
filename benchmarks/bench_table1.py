"""Benchmark target regenerating Table 1 (workload characteristics)."""
import os

from repro.bench.config import current_scale
from repro.kg.entities import kg_entities
from repro.kg.table1 import format_table1, workload_characteristics
from repro.kg.workload import relatedqs_workload

RESULTS_DIR = os.path.join(os.path.dirname(__file__), "..", "bench_results")


def _emit(name: str, text: str) -> None:
    os.makedirs(RESULTS_DIR, exist_ok=True)
    with open(os.path.join(RESULTS_DIR, name), "w") as f:
        f.write(text + "\n")
    print("\n" + text)


def test_table1_workload_characteristics(benchmark):
    scale = current_scale()

    def run():
        ds = kg_entities(n=scale.kg_n, dim=scale.kg_dim, seed=0)
        splits = relatedqs_workload(
            ds, n_queries_per_split=scale.relatedqs_per_split, seed=0
        )
        return workload_characteristics(ds, splits)

    df = benchmark.pedantic(run, rounds=1, iterations=1)
    _emit("table1.txt", "Table 1 (reproduction)\n" + format_table1(df))
    assert len(df) == 10
