"""Table III benchmark: BASE vs BASE+ vs GAS greedy anchoring.

pytest-benchmark target regenerating the Table III runtime comparison
at micro scale (college_mini, b=3). The expected shape — and the
paper's — is BASE >> BASE+ > GAS.
"""
import pytest

from repro.core.greedy import run_greedy
from repro.exp.datasets import load
from repro.truss.local import LocalGraph


@pytest.fixture(scope="module")
def graph() -> LocalGraph:
    return load("college_mini")


@pytest.mark.benchmark(group="table3-greedy")
@pytest.mark.parametrize("method", ["base", "base+", "gas"])
def test_greedy_method(benchmark, spark, graph, method):
    result = benchmark.pedantic(
        lambda: run_greedy(spark, graph, 3, method),
        rounds=3,
        iterations=1,
        warmup_rounds=0,
    )
    assert result.total_gain >= 0


@pytest.mark.benchmark(group="table3-randoms")
def test_random_baseline_trials(benchmark, spark, graph):
    import numpy as np

    from repro.baselines.random_sets import random_baseline
    from repro.truss.local import decompose

    st = decompose(graph)
    gain, _ = benchmark.pedantic(
        lambda: random_baseline(
            spark, graph, st, 3, np.arange(graph.m), trials=20, seed=1
        ),
        rounds=3,
        iterations=1,
        warmup_rounds=0,
    )
    assert gain >= 0
