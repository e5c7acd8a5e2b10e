"""Lite dataset registry: specs honored, caching, determinism."""
import numpy as np

from repro.experiments.datasets import (
    _EVOLVING_SPECS,
    _SPECS,
    load_dataset,
    load_evolving,
)


def test_specs_cover_paper_tables():
    assert set(_SPECS) == {
        "wiki_lite", "blogcatalog_lite", "youtube_lite", "tweibo_lite",
        "orkut_lite", "twitter_lite", "friendster_lite",
    }
    assert set(_EVOLVING_SPECS) == {"vk_lite", "digg_lite"}


def test_small_dataset_matches_spec():
    b = load_dataset("wiki_lite")
    assert b.graph.n == 2400 and b.graph.m == 93_000
    assert b.graph.directed
    assert b.labels is not None and len(np.unique(b.labels)) == 20
    assert b.paper_name == "Wiki"


def test_directedness_matches_paper():
    assert load_dataset("tweibo_lite").graph.directed
    assert not load_dataset("blogcatalog_lite").graph.directed


def test_unlabeled_datasets():
    # Twitter/Friendster carry no labels in the paper (Table 3)
    assert load_dataset("twitter_lite").labels is None


def test_caching_returns_same_object():
    assert load_dataset("wiki_lite") is load_dataset("wiki_lite")


def test_evolving_dataset():
    g_old, new, paper = load_evolving("digg_lite")
    assert paper == "Digg" and g_old.directed
    assert g_old.m == 22_000 and new.shape == (15_000, 2)


def test_directed_dataset_has_asymmetric_roles():
    # directed DC-SBM draws independent in/out propensities, so in- and
    # out-degree sequences must decorrelate (direction carries signal)
    g = load_dataset("wiki_lite").graph
    r = np.corrcoef(g.d_out, g.d_in)[0, 1]
    assert r < 0.9
