"""Benchmark + reproduction of Table 5 (clustering comparison, ARI)."""
from repro.experiments import table5
from repro.experiments.common import markdown_table


def test_table5_clustering(benchmark, results_dir):
    df = benchmark.pedantic(lambda: table5.run(n=800), rounds=1, iterations=1)
    (results_dir / "table5.md").write_text(markdown_table(df))
    r = df.set_index(["dataset", "method"])["ari"]
    # Paper's picture: K-means fails the non-convex sets, ours matches
    # spectral-quality clustering on all three.
    assert r[("moons", "K-means")] < 0.5 and r[("circles", "K-means")] < 0.5
    for ds in ("moons", "circles", "blobs4"):
        assert r[(ds, "Ours")] > 0.9
