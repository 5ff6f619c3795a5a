"""Benchmark + reproduction of Table 4 (candidate-set decrease at fixed
10-NN accuracy, SIFT, 16 bins).

The expensive part (index builds) runs once; the benchmarked operation is
the online sweep. Writes table4.md and the per-method curves (the Fig. 5a
row data the table is read from).
"""
import pytest

from repro.experiments import table4
from repro.experiments.common import markdown_table


@pytest.fixture(scope="module")
def result():
    return table4.run(scale="bench", epochs=25, seed=0)


def test_table4_candidate_decrease(benchmark, results_dir, result):
    df, curves, target = result
    benchmark.pedantic(
        lambda: table4.run(scale="test", epochs=5, seed=1), rounds=1, iterations=1
    )
    out = [f"target accuracy: {target:.4f}", "", markdown_table(df, floatfmt="{:.3f}")]
    for name, c in curves.items():
        out += ["", f"### curve: {name}", markdown_table(c)]
    (results_dir / "table4.md").write_text("\n".join(out))
    # Paper's shape: our candidate sets are smaller than both baselines'.
    m = df.set_index("method")
    assert (m["measured_decrease"] > 0).all(), m
