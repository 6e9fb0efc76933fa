"""Tests for the synthetic graph substrate (generators + dataset registry)."""
import numpy as np
import pytest

from repro.graphs import datasets, generators as gen
from repro.oracle import assert_equivalent


def _assert_simple(g: gen.Graph):
    e = g.edge_array
    assert (e[:, 0] < e[:, 1]).all(), "edges must be normalized u < v"
    assert len(np.unique(e, axis=0)) == len(e), "no duplicate edges"


@pytest.mark.parametrize("name", sorted(datasets.DATASETS))
def test_dataset_is_simple_and_deterministic(name):
    g1, g2 = datasets.load(name), datasets.load(name)
    _assert_simple(g1)
    assert np.array_equal(g1.edge_array, g2.edge_array)
    assert g1.n > 100 and g1.m > 300


def test_dataset_registry_matches_paper_table1():
    """The registry mirrors all 9 Table 1 rows."""
    assert len(datasets.DATASETS) == 9
    assert set(datasets.CC_COMPARISON_GRAPHS) <= set(datasets.DATASETS)
    paper_edges = {s.name: s.paper_medges for s in datasets.DATASETS.values()}
    assert paper_edges["friendster"] == 1806.1  # the 1.8B-edge headline graph
    assert paper_edges["twitter"] == 1202.5


def test_berkstan_analog_has_outlier_hub():
    """BerkStan's signature: one-few hubs with degree >> everyone else."""
    g = datasets.load("berkstan")
    deg = np.sort(g.degrees)[::-1]
    assert deg[0] > 20 * np.median(g.degrees)
    assert deg[0] > 1000


def test_yelp_analog_is_star_dominated():
    """Yelp's signature: most vertices are degree-1 leaves of a few hubs."""
    g = datasets.load("yelp")
    frac_leaves = float((g.degrees <= 2).mean())
    assert frac_leaves > 0.9
    assert g.max_degree >= 100


def test_ba_graph_heavy_tail():
    g = gen.ba_graph(3000, 5, seed=1)
    deg = g.degrees
    # preferential attachment: max degree far above the mean
    assert deg.max() > 8 * deg.mean()
    assert g.m >= 5 * (3000 - 6) * 0.8


def test_er_graph_flat_degrees():
    g = gen.er_graph(2000, 10000, seed=2)
    assert g.degrees.max() < 5 * g.degrees.mean()


def test_lollipop_structure():
    n, k = 30, 5
    g = gen.lollipop_graph(n, k)
    cn = n - k + 2
    assert g.n == n
    assert g.m == cn * (cn - 1) // 2 + (k - 2)
    # dangling path endpoints have degree 1
    assert g.degrees[-1] == 1


def test_complete_path_star():
    assert gen.complete_graph(6).m == 15
    assert gen.path_graph(10).m == 9
    g = gen.star_graph(12)
    assert g.m == 11 and g.max_degree == 11


def test_adjacency_consistency():
    g = gen.er_graph(500, 2000, seed=3)
    for v in (0, 7, 42):
        nb = g.adj[v]
        assert (np.diff(nb) > 0).all(), "adjacency must be sorted and unique"
        for u in nb[:5]:
            assert g.has_edge(v, int(u)) and g.has_edge(int(u), v)
    assert not g.has_edge(0, 0)
    assert g.degrees.sum() == 2 * g.m


def test_edges_df_symmetric(spark):
    """The Spark edge view holds both directions of every edge — checked
    against DuckDB on the degree aggregation."""
    g = gen.er_graph(300, 900, seed=4)
    df = g.edges_df(spark)
    assert df.count() == 2 * g.m
    import pandas as pd

    deg_df = df.groupBy("src").count().withColumnRenamed("count", "deg")
    pdf = pd.DataFrame({"src": g.edge_array[:, 0], "dst": g.edge_array[:, 1]})
    assert_equivalent(
        deg_df,
        """
        WITH sym AS (
          SELECT src, dst FROM halfedges
          UNION ALL
          SELECT dst AS src, src AS dst FROM halfedges
        )
        SELECT src, COUNT(*) AS deg FROM sym GROUP BY src
        """,
        halfedges=pdf,
    )
