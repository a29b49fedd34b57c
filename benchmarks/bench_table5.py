"""Table V benchmark: AKT sweep vs GAS at equal budget."""
import pytest

from repro.baselines.akt import akt_sweep
from repro.core.greedy import run_greedy
from repro.exp.datasets import load
from repro.truss.local import decompose


@pytest.fixture(scope="module")
def graph():
    g = load("college_mini")
    return g, decompose(g)


@pytest.mark.benchmark(group="table5")
def test_gas(benchmark, spark, graph):
    g, _ = graph
    res = benchmark.pedantic(
        lambda: run_greedy(spark, g, 2, "gas"),
        rounds=3,
        iterations=1,
        warmup_rounds=0,
    )
    assert res.total_gain >= 0


@pytest.mark.benchmark(group="table5")
def test_akt_sweep(benchmark, spark, graph):
    g, st = graph
    sweep = benchmark.pedantic(
        lambda: akt_sweep(spark, g, st, b=2),
        rounds=3,
        iterations=1,
        warmup_rounds=0,
    )
    assert all(v >= 0 for v in sweep.values())
