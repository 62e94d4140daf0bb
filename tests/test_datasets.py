"""Integration tests for the 14 Table 3 dataset stand-ins."""
import numpy as np
import pytest

from repro.graphs import datasets
from repro.metrics import connectivity

SCALE = 0.12

EXPECTED = {
    # name: (directed, weighted, connected)
    "facebook_lite": (False, False, True),
    "twitter_lite": (True, False, False),
    "gene_lite": (False, True, False),
    "dblp_lite": (False, False, True),
    "amazon_lite": (False, False, True),
    "enron_lite": (False, False, False),
    "astroph_lite": (False, False, False),
    "hepph_lite": (False, False, False),
    "berkstan_lite": (True, False, False),
    "google_lite": (True, False, False),
    "notredame_lite": (True, False, False),
    "stanford_lite": (True, False, False),
    "reddit_lite": (False, False, True),
    "proteins_lite": (False, False, True),
}


@pytest.fixture(scope="module")
def loaded(spark):
    return {
        name: datasets.load(spark, name, scale=SCALE, seed=0)
        for name in datasets.LOADERS
    }


@pytest.mark.parametrize("name", sorted(EXPECTED))
def test_flags(loaded, name):
    directed, weighted, _ = EXPECTED[name]
    ds = loaded[name]
    assert ds.graph.directed == directed
    assert ds.graph.weighted == weighted


@pytest.mark.parametrize("name", sorted(EXPECTED))
def test_nonempty_and_clean(loaded, name):
    g = loaded[name].graph
    assert g.n > 0 and g.m > 0
    # preprocessing guarantees no isolated vertices at load time
    from repro.graphs.prep import isolated_count

    assert isolated_count(g) == 0


@pytest.mark.parametrize(
    "name", [n for n, (_, _, c) in EXPECTED.items() if c]
)
def test_connected_datasets_are_connected(loaded, name):
    assert connectivity.is_connected(loaded[name].graph)


# Only the stand-ins with an explicitly planted second component must be
# disconnected at every scale; the R-MAT/zipf digraphs are *weakly*
# connectable at tiny test scale (checked at full scale by the Table 3 job).
@pytest.mark.parametrize("name", ["gene_lite", "enron_lite", "astroph_lite", "hepph_lite"])
def test_disconnected_datasets_have_components(loaded, name):
    assert connectivity.num_components(loaded[name].graph) > 1


def test_all_14_present():
    assert len(datasets.LOADERS) == 14
    assert set(datasets.LOADERS) == set(EXPECTED)


def test_gnn_datasets_have_labels(loaded):
    for name in ("reddit_lite", "proteins_lite", "dblp_lite", "amazon_lite"):
        ds = loaded[name]
        assert ds.labels is not None
        assert len(ds.labels) == ds.graph.n


def test_labels_align_with_communities(loaded):
    """Planted labels should agree with graph structure: most edges intra."""
    ds = loaded["reddit_lite"]
    e = ds.graph.to_pandas_edges()
    same = (ds.labels[e["src"]] == ds.labels[e["dst"]]).mean()
    assert same > 0.6


def test_deterministic_across_loads(spark, loaded):
    again = datasets.load(spark, "dblp_lite", scale=SCALE, seed=0)
    a = loaded["dblp_lite"].graph.to_pandas_edges().sort_values(["src", "dst"])
    b = again.graph.to_pandas_edges().sort_values(["src", "dst"])
    assert (a.to_numpy() == b.to_numpy()).all()


def test_scale_changes_size(spark, loaded):
    big = datasets.load(spark, "facebook_lite", scale=0.3, seed=0)
    assert big.graph.n > loaded["facebook_lite"].graph.n


def test_weighted_dataset_weights(loaded):
    w = loaded["gene_lite"].graph.to_pandas_edges()["weight"]
    assert (w > 0).all() and w.nunique() > 10


def test_mimics_metadata(loaded):
    assert loaded["facebook_lite"].mimics == "ego-Facebook"
    assert loaded["proteins_lite"].mimics == "ogbn-proteins"
    categories = {ds.category for ds in loaded.values()}
    assert {"Social Network", "web", "GNN", "gene"} <= categories
