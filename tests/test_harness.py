"""Harness smoke tests on tiny configurations (full runs live in
benchmarks/; these verify row shapes, eligibility handling, and the
Table 1 reproduction end to end)."""
import numpy as np
import pytest

from repro.baselines.registry import get_method
from repro.experiments import harness as H
from repro.experiments.datasets import load_dataset
from repro.graphs.generators import example_graph


def test_table1_exact_matches_paper_rows():
    df = H.table1_ppr()
    for src in ("v2", "v4", "v9"):
        sub = df[df.source == src]
        np.testing.assert_allclose(sub.exact, sub.paper, atol=1.5e-3)
    # the paper's v7 row is a typo (DESIGN.md §4): our exact value for
    # pi(v7, v9) obeys the reversibility identity instead
    v7 = df[(df.source == "v7") & (df.target == "v9")]
    assert float(v7.exact.iloc[0]) == pytest.approx(0.084, abs=1.5e-3)


def test_table1_with_spark(spark):
    df = H.table1_ppr(spark)
    np.testing.assert_allclose(df.exact, df.spark, atol=1e-3)


def test_datasets_table_shape():
    df = H.datasets_table()
    assert list(df.paper_dataset) == [
        "Wiki", "BlogCatalog", "Youtube", "TWeibo", "Orkut", "Twitter",
        "Friendster",
    ]


def test_evolving_datasets_table_shape():
    df = H.evolving_datasets_table()
    assert set(df.paper_dataset) == {"VK", "Digg"}


def test_eligibility_and_protocol():
    g = load_dataset("tweibo_lite").graph  # n = 15000, directed
    assert not H.eligible(get_method("gae"), g)
    assert H.eligible(get_method("nrp"), g)
    assert H.protocol_for(get_method("nrp"), g) == "inner"
    assert H.protocol_for(get_method("deepwalk"), g) == "edge_features"
    gu = load_dataset("blogcatalog_lite").graph  # undirected
    assert H.protocol_for(get_method("deepwalk"), gu) == "inner"
    assert H.protocol_for(get_method("randne"), g) == "inner"


def test_link_prediction_table_excludes_capped_methods():
    df = H.link_prediction_table(["tweibo_lite"], ["gae"], [8], seed=0)
    assert df.auc.isna().all()
    assert df.note.str.contains("excluded").all()


def test_param_sweep_tiny():
    df = H.param_sweep_table(
        "wiki_lite", alphas=(0.15,), epss=(0.2,), l1s=(5,), l2s=(0, 2),
        k=8, seed=0,
    )
    assert set(df.param) == {"alpha", "eps", "l1", "l2"}
    assert df.auc.between(0, 1).all()


def test_scalability_table_tiny():
    df = H.scalability_table(
        None, ns=(2000,), ms=(4000,), fixed_n=2000, fixed_m=4000,
        k=8, l1=5, l2=2, seed=0,
    )
    assert len(df) == 2 and (df.seconds > 0).all()


def test_evolving_table_tiny():
    df = H.evolving_table(["vk_lite"], ["approxppr"], k=8, seed=0)
    assert len(df) == 1 and 0 <= float(df.auc.iloc[0]) <= 1
