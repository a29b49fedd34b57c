"""Table IV benchmark: distributed upward-route size computation."""
import pytest

from repro.core.routes import route_sizes_spark, route_stats
from repro.exp.datasets import load
from repro.truss.local import decompose


@pytest.mark.benchmark(group="table4-routes")
@pytest.mark.parametrize("name", ["college_mini", "facebook_mini", "sparse_mini"])
def test_route_sweep(benchmark, spark, name):
    g = load(name)
    st = decompose(g)
    sizes = benchmark.pedantic(
        lambda: route_sizes_spark(spark, g, st),
        rounds=3,
        iterations=1,
        warmup_rounds=0,
    )
    stats = route_stats(sizes)
    assert stats["sum"] >= 0
