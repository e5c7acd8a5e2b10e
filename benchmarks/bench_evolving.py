"""Bench for paper Appendix Fig. 9: link prediction on evolving graphs."""
import pandas as pd

from benchmarks._util import save
from repro.experiments.harness import evolving_table

METHODS = ["nrp", "approxppr", "strap", "arope", "randne", "prone",
           "verse", "app"]


def test_fig9_evolving(benchmark):
    df = benchmark.pedantic(
        lambda: evolving_table(["vk_lite", "digg_lite"], METHODS, k=32, seed=0),
        rounds=1, iterations=1,
    )
    save(df, "fig9_evolving")
    ok = df.dropna(subset=["auc"])
    assert (ok.auc > 0.5).all()  # everyone beats chance on future edges
    # shape: the PPR-based dual-vector group (NRP/STRAP/ApproxPPR) leads
    # the single-vector methods on both evolving graphs. (On our synthetic
    # triadic-closure growth STRAP's transpose proximity edges out NRP on
    # digg_lite — a documented deviation from the paper's real-Digg margin,
    # see EXPERIMENTS.md.)
    for ds, sub in ok.groupby("dataset"):
        nrp = float(sub[sub.method == "nrp"].auc.iloc[0])
        single = sub[sub.method.isin(["verse", "randne"])]
        if len(single):
            assert nrp > single.auc.max(), ds
        assert nrp >= sub.auc.max() - 0.1, ds
