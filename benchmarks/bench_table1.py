"""Benchmark for the Table I pipeline (survey simulation)."""
from repro.core.tables import table1


def test_bench_table1_survey(benchmark):
    tab = benchmark.pedantic(
        table1, kwargs={"n_nodes": 1500, "seed": 7, "n_surveyed": 300},
        rounds=3, iterations=1,
    )
    assert len(tab) == 17  # 4 first categories × their second categories
