"""Benchmark for the Table V pipeline (community classification)."""
from repro.core.experiment import make_experiment
from repro.core.tables import table5


def test_bench_table5(benchmark, spark):
    ex = make_experiment(spark, n_nodes=500, seed=7)

    def run():
        return table5(spark, cnn_epochs=10, experiment=ex)

    tab = benchmark.pedantic(run, rounds=1, iterations=1)
    overall = tab[tab["type"] == "overall"]
    assert (overall["f1"] > 0.4).all()
