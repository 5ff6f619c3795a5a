"""Benchmark + reproduction of Table 2 (parameter counts, 256 bins).

The benchmarked operation is model instantiation + parameter counting; the
table itself is written to benchmarks/results/table2.md.
"""
from repro.experiments import table2
from repro.experiments.common import markdown_table


def test_table2_params(benchmark, results_dir):
    df = benchmark(table2.run)
    (results_dir / "table2.md").write_text(markdown_table(df, floatfmt="{:.0f}"))
    m = df.set_index("method")
    # Paper ordering: Neural LSH ≫ Ours ≫ K-means.
    assert m.loc["Neural LSH", "measured_d128"] > m.loc["Ours", "measured_d128"]
    assert m.loc["Ours", "measured_d128"] > m.loc["K-Means", "measured_d128"]
