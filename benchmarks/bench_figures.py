"""Benchmark + reproduction of the figure-shaped evidence (Figs. 5–7) that
Table 4 and the ScaNN-speedup claim read from. Each sweep runs once at
bench scale and writes its row data to benchmarks/results/.
"""
import numpy as np
import pytest

from repro.experiments import figures
from repro.experiments.common import markdown_table
from repro.index.search import candidate_size_at_accuracy
from repro.scann.pipelines import speedup_at_recall


def _curves_by_method(df):
    return {m: g.sort_values("n_probes") for m, g in df.groupby("method")}


def test_fig5_sift16(benchmark, results_dir):
    df = benchmark.pedantic(
        lambda: figures.fig5("sift", 16, scale="bench", epochs=25), rounds=1, iterations=1
    )
    (results_dir / "fig5_sift16.md").write_text(markdown_table(df))
    by = _curves_by_method(df)
    # Learned methods beat data-oblivious CP-LSH at equal probe depth.
    if "CP-LSH" in by:
        assert (
            by["Ours"]["accuracy"].iloc[0] > by["CP-LSH"]["accuracy"].iloc[0]
        )
    # Ours at least matches Neural LSH at 1 probe (paper: similar at 16 bins,
    # better with ensembling).
    assert by["Ours"]["accuracy"].iloc[0] >= by["Neural LSH"]["accuracy"].iloc[0] - 0.02


def test_fig5_mnist16(benchmark, results_dir):
    df = benchmark.pedantic(
        lambda: figures.fig5("mnist", 16, scale="bench", epochs=25), rounds=1, iterations=1
    )
    (results_dir / "fig5_mnist16.md").write_text(markdown_table(df))
    by = _curves_by_method(df)
    assert by["Ours"]["accuracy"].iloc[0] >= by["K-means"]["accuracy"].iloc[0] - 0.05


def test_fig5_sift256_hierarchical(benchmark, results_dir):
    df = benchmark.pedantic(
        lambda: figures.fig5("sift", 256, scale="bench", epochs=20), rounds=1, iterations=1
    )
    (results_dir / "fig5_sift256.md").write_text(markdown_table(df))
    by = _curves_by_method(df)
    # 256-bin regime: the paper reports ours beats Neural LSH outright.
    # Compare |C| needed for 90% accuracy.
    ours = candidate_size_at_accuracy(by["Ours"], 0.9)
    nlsh = candidate_size_at_accuracy(by["Neural LSH"], 0.9)
    assert ours is not None
    if nlsh is not None:
        assert ours < nlsh * 1.5  # allow noise; shape check is ours ≤ nlsh


def test_fig6_trees(benchmark, results_dir):
    df = benchmark.pedantic(
        lambda: figures.fig6("sift", depth=8, scale="bench", epochs=15), rounds=1, iterations=1
    )
    (results_dir / "fig6_trees.md").write_text(markdown_table(df))
    by = _curves_by_method(df)
    # Paper: our LR tree significantly outperforms Regression LSH in the
    # high-accuracy regime → needs fewer candidates for 95% accuracy.
    ours = candidate_size_at_accuracy(by["Ours (LR tree)"], 0.95)
    reg = candidate_size_at_accuracy(by["Regression LSH"], 0.95)
    assert ours is not None
    if reg is not None:
        assert ours <= reg * 1.2


def test_fig7_scann_pipelines(benchmark, results_dir):
    df = benchmark.pedantic(
        lambda: figures.fig7("sift", scale="bench", epochs=25), rounds=1, iterations=1
    )
    (results_dir / "fig7_scann.md").write_text(markdown_table(df))
    by = {m: g for m, g in df.groupby("method")}
    # Paper's headline: USP+ScaNN reaches matched recall faster than
    # K-means+ScaNN (≈40% speedup on average). The advantage lives in the
    # high-recall regime, where candidate quality (not probe-scoring cost)
    # dominates query time — report the speedup across targets.
    lines = []
    for target in (0.95, 0.97, 0.98, 0.99):
        sp = speedup_at_recall(by["USP + ScaNN"], by["K-means + ScaNN"], target)
        lines.append(
            f"speedup of USP+ScaNN over K-means+ScaNN at recall {target}: "
            f"{'n/a' if sp is None else f'{sp:.1%}'} (paper average: ~40%)"
        )
    (results_dir / "fig7_speedup.md").write_text("\n".join(lines) + "\n")
    vans = speedup_at_recall(by["USP + ScaNN"], by["Vanilla ScaNN"], 0.95)
    assert vans is None or vans > 0  # partitioning always beats full ADC scan
    hi = speedup_at_recall(by["USP + ScaNN"], by["K-means + ScaNN"], 0.98)
    assert hi is None or hi > -0.1  # USP at least matches K-means at high recall
