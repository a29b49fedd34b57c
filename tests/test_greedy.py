"""BASE / BASE+ / GAS equivalence, caching exactness, Spark fan-out."""
import pytest

from repro.core.greedy import get_followers_by_decomp, run_greedy
from repro.graphs.gen import community_graph, random_graph
from repro.graphs.toys import truss_ladder
from repro.truss.local import LocalGraph, decompose

LOCAL = 10**9  # spark_threshold that forces driver-side evaluation


def _graphs():
    yield "ladder", truss_ladder()
    for seed in range(4):
        yield (
            f"comm{seed}",
            community_graph(
                n=50, n_cliques=20, clique_max=8, n_noise=18, drop_frac=0.1, seed=seed
            ),
        )
    yield "rand", random_graph(n=30, m=85, seed=3)


CASES = list(_graphs())


@pytest.mark.parametrize("label,pdf", CASES, ids=[c[0] for c in CASES])
def test_methods_equivalent(label, pdf):
    g = LocalGraph(pdf)
    rb = run_greedy(None, g, 3, "base", spark_threshold=LOCAL)
    rp = run_greedy(None, g, 3, "base+", spark_threshold=LOCAL)
    rg = run_greedy(None, g, 3, "gas", spark_threshold=LOCAL)
    assert rb.anchors == rp.anchors == rg.anchors, label
    assert rb.total_gain == rp.total_gain == rg.total_gain


@pytest.mark.parametrize("label,pdf", CASES[:3], ids=[c[0] for c in CASES[:3]])
def test_round_gains_sum_to_total(label, pdf):
    g = LocalGraph(pdf)
    r = run_greedy(None, g, 4, "gas", spark_threshold=LOCAL)
    assert sum(rd.gain for rd in r.rounds) == r.total_gain


def test_gas_reuses_cache():
    g = LocalGraph(
        community_graph(n=60, n_cliques=25, clique_max=8, n_noise=20, drop_frac=0.1, seed=2)
    )
    r = run_greedy(None, g, 3, "gas", spark_threshold=LOCAL)
    assert r.rounds[0].reused == 0
    assert any(rd.reused > 0 for rd in r.rounds[1:])


def test_anchors_are_distinct_and_valid():
    g = LocalGraph(truss_ladder())
    r = run_greedy(None, g, 5, "gas", spark_threshold=LOCAL)
    assert len(set(r.anchors)) == len(r.anchors)
    assert all(0 <= a < g.m for a in r.anchors)
    assert len(r.anchor_edges) == len(r.anchors)


def test_budget_capped_by_edge_count():
    g = LocalGraph(truss_ladder())
    r = run_greedy(None, g, g.m + 10, "base+", spark_threshold=LOCAL)
    assert len(r.anchors) <= g.m


def test_unknown_method_raises():
    g = LocalGraph(truss_ladder())
    with pytest.raises(ValueError):
        run_greedy(None, g, 1, "bogus")


def test_track_tree_reports_classes():
    g = LocalGraph(
        community_graph(n=40, n_cliques=14, n_noise=10, drop_frac=0.12, seed=4)
    )
    r = run_greedy(None, g, 2, "gas", spark_threshold=LOCAL, track_tree=True)
    assert r.rounds[0].reuse_classes  # populated after the first anchoring
    assert set().union(*[set(rd.reuse_classes) for rd in r.rounds]) <= {"FR", "PR", "NR"}


def test_base_followers_by_decomp_matches_kernel():
    from repro.core.followers import get_followers

    g = LocalGraph(community_graph(n=35, n_cliques=12, n_noise=10, drop_frac=0.12, seed=5))
    st = decompose(g)
    for x in range(0, g.m, 4):
        assert get_followers_by_decomp(g, st, frozenset(), x) == get_followers(
            g, st, x
        ).followers


# ---- distributed paths -------------------------------------------------

def test_gas_spark_path_matches_local(spark):
    g = LocalGraph(
        community_graph(n=50, n_cliques=18, n_noise=15, drop_frac=0.1, seed=6)
    )
    local = run_greedy(None, g, 2, "gas", spark_threshold=LOCAL)
    dist = run_greedy(spark, g, 2, "gas", spark_threshold=0)
    assert local.anchors == dist.anchors
    assert local.total_gain == dist.total_gain


def test_base_spark_path_matches_local(spark):
    g = LocalGraph(
        community_graph(n=35, n_cliques=12, n_noise=8, drop_frac=0.1, seed=7)
    )
    local = run_greedy(None, g, 2, "base", spark_threshold=LOCAL)
    dist = run_greedy(spark, g, 2, "base", spark_threshold=0)
    assert local.anchors == dist.anchors
    assert local.total_gain == dist.total_gain


def test_base_plus_spark_path_matches_local(spark):
    g = LocalGraph(
        community_graph(n=40, n_cliques=15, n_noise=10, drop_frac=0.1, seed=8)
    )
    local = run_greedy(None, g, 2, "base+", spark_threshold=LOCAL)
    dist = run_greedy(spark, g, 2, "base+", spark_threshold=0)
    assert local.anchors == dist.anchors
    assert local.total_gain == dist.total_gain
