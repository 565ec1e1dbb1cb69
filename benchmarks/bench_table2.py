"""Benchmark for the Table II pipeline (group-name rule mining)."""
from repro.core.tables import table2


def test_bench_table2_groupnames(benchmark):
    tab = benchmark.pedantic(
        table2, kwargs={"n_nodes": 1500, "seed": 7}, rounds=3, iterations=1
    )
    assert set(tab["type"]) == {"family", "colleague", "schoolmate"}
