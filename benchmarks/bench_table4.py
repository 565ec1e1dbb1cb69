"""Benchmarks for the Table IV methods (edge classification).

One benchmark per comparative method at a reduced scale (n=500), each
covering the method's full fit+predict path. The full-scale numbers in
EXPERIMENTS.md come from ``jobs/table4_edge_classification.py``.
"""
import pytest

from repro.baselines.economix import Economix
from repro.baselines.probwp import ProbWP
from repro.baselines.xgboost_edge import XGBoostEdge
from repro.core.experiment import make_experiment, score_edge_predictions
from repro.core.locec import run_locec

N_NODES = 500


@pytest.fixture(scope="module")
def ex(spark):
    return make_experiment(spark, n_nodes=N_NODES, seed=7)


def _overall_f1(ex, pred):
    t = score_edge_predictions(ex.test, pred)
    return float(t.loc[t["type"] == "overall", "f1"].iloc[0])


def test_bench_probwp(benchmark, spark, ex):
    def run():
        return ProbWP(top_k=10).fit(spark, ex.edges, ex.train).predict(ex.test)

    pred = benchmark.pedantic(run, rounds=1, iterations=1)
    assert _overall_f1(ex, pred) > 0.4


def test_bench_economix(benchmark, ex):
    def run():
        return Economix().fit(ex.net.edges, ex.net.interactions, ex.train).predict(ex.test)

    pred = benchmark.pedantic(run, rounds=2, iterations=1)
    assert _overall_f1(ex, pred) > 0.4


def test_bench_xgboost(benchmark, ex):
    def run():
        return XGBoostEdge().fit(ex.net.users, ex.net.interactions, ex.train).predict(ex.test)

    pred = benchmark.pedantic(run, rounds=2, iterations=1)
    assert _overall_f1(ex, pred) > 0.4


def test_bench_locec_xgb(benchmark, spark, ex):
    def run():
        res = run_locec(
            spark, ex.edges, ex.interactions, ex.users, ex.train_df(spark),
            variant="xgb", gbdt_rounds=25, lr_epochs=200,
        )
        return res.edge_pred.toPandas()

    pred = benchmark.pedantic(run, rounds=1, iterations=1)
    assert _overall_f1(ex, pred) > 0.5


def test_bench_locec_cnn(benchmark, spark, ex):
    def run():
        res = run_locec(
            spark, ex.edges, ex.interactions, ex.users, ex.train_df(spark),
            variant="cnn", cnn_epochs=15, lr_epochs=200,
        )
        return res.edge_pred.toPandas()

    pred = benchmark.pedantic(run, rounds=1, iterations=1)
    assert _overall_f1(ex, pred) > 0.5
