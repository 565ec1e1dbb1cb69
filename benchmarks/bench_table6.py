"""Benchmarks for Table VI: per-phase running time of LoCEC-CNN.

Each phase is benchmarked through ``run_locec``'s phase timers; the
assertion encodes the paper's qualitative result — Phase I (community
detection) dominates the pipeline.
"""
import pytest

from repro.core.experiment import make_experiment
from repro.core.locec import run_locec


@pytest.fixture(scope="module")
def ex(spark):
    return make_experiment(spark, n_nodes=500, seed=7)


def test_bench_locec_phases(benchmark, spark, ex):
    timings = {}

    def run():
        res = run_locec(
            spark, ex.edges, ex.interactions, ex.users, ex.train_df(spark),
            variant="cnn", cnn_epochs=8, lr_epochs=150,
        )
        timings.update(res.timings)
        return res

    benchmark.pedantic(run, rounds=1, iterations=1)
    # the paper's Table VI shape: division is the most expensive phase
    assert timings["phase1"] > timings["phase3"]
    assert timings["total"] == pytest.approx(
        timings["phase1"] + timings["phase2"] + timings["phase3"]
    )


def test_bench_phase1_only(benchmark, spark, ex):
    from repro.core.communities import member_features

    def run():
        df = member_features(spark, ex.edges, ex.interactions)
        return df.count()

    n = benchmark.pedantic(run, rounds=1, iterations=1)
    assert n == 2 * ex.net.n_edges
