"""Synthetic OLAP data at a configurable scale factor.

SF=1.0 is roughly TPC-H SF1 (~1 GB across tables). Tests use SF<=0.01;
benchmarks use SF~=0.1. Generators are deterministic in ``seed`` so the
DuckDB oracle sees identical input.
"""
import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

_N_LINEITEM_PER_SF = 6_000_000
_N_ORDERS_PER_SF = 1_500_000
_N_CUSTOMER_PER_SF = 150_000
_N_PART_PER_SF = 200_000


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def lineitem(spark: SparkSession, *, sf: float = 0.01, seed: int = 0) -> DataFrame:
    n = max(1, int(_N_LINEITEM_PER_SF * sf))
    n_orders = max(1, int(_N_ORDERS_PER_SF * sf))
    n_part = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "l_orderkey": g.integers(1, n_orders + 1, n),
            "l_partkey": g.integers(1, n_part + 1, n),
            "l_linenumber": g.integers(1, 8, n),
            "l_quantity": g.integers(1, 51, n).astype("float64"),
            "l_extendedprice": (g.random(n) * 90000 + 900).round(2),
            "l_discount": (g.random(n) * 0.1).round(2),
            "l_tax": (g.random(n) * 0.08).round(2),
            "l_returnflag": g.choice(list("NRA"), n),
            "l_linestatus": g.choice(list("OF"), n),
            "l_shipdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2557, n), unit="D"),
        }
    )
    return spark.createDataFrame(pdf)


def orders(spark: SparkSession, *, sf: float = 0.01, seed: int = 1) -> DataFrame:
    n = max(1, int(_N_ORDERS_PER_SF * sf))
    n_cust = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "o_orderkey": np.arange(1, n + 1),
            "o_custkey": g.integers(1, n_cust + 1, n),
            "o_orderstatus": g.choice(list("OFP"), n),
            "o_totalprice": (g.random(n) * 500000 + 1000).round(2),
            "o_orderdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2406, n), unit="D"),
            "o_orderpriority": g.choice(
                ["1-URGENT", "2-HIGH", "3-MEDIUM", "4-NOT", "5-LOW"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def part(spark: SparkSession, *, sf: float = 0.01, seed: int = 5) -> DataFrame:
    n = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "p_partkey": np.arange(1, n + 1),
            "p_type": g.choice(
                ["STANDARD", "SMALL", "MEDIUM", "LARGE", "ECONOMY", "PROMO"], n
            ),
            "p_brand": g.choice([f"Brand#{i}{j}" for i in range(1, 6) for j in range(1, 6)], n),
            "p_size": g.integers(1, 51, n),
            "p_retailprice": (900 + (np.arange(1, n + 1) % 1000) / 10.0).round(2),
        }
    )
    return spark.createDataFrame(pdf)


def customer(spark: SparkSession, *, sf: float = 0.01, seed: int = 2) -> DataFrame:
    n = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "c_custkey": np.arange(1, n + 1),
            "c_nationkey": g.integers(0, 25, n),
            "c_acctbal": (g.random(n) * 10000 - 1000).round(2),
            "c_mktsegment": g.choice(
                ["BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def zipf_keys(spark: SparkSession, *, n: int, n_keys: int, alpha: float = 1.1, seed: int = 3) -> DataFrame:
    """Skewed key column — for join-skew / cardinality-estimation papers."""
    g = _rng(seed)
    ranks = np.arange(1, n_keys + 1)
    weights = 1.0 / ranks**alpha
    weights /= weights.sum()
    keys = g.choice(ranks, size=n, p=weights)
    return spark.createDataFrame(pd.DataFrame({"k": keys, "v": g.random(n)}))


def uniform_keys(spark: SparkSession, *, n: int, n_keys: int, seed: int = 4) -> DataFrame:
    g = _rng(seed)
    return spark.createDataFrame(
        pd.DataFrame({"k": g.integers(1, n_keys + 1, n), "v": g.random(n)})
    )


# ---------------------------------------------------------------------------
# Vector datasets for the ANN-search reproduction (EDBT'23 USP paper).
#
# The paper evaluates on SIFT (1M x 128) and MNIST (60k x 784) from
# ann-benchmarks, which cannot be downloaded offline. ``sift_lite`` and
# ``mnist_lite`` are GMM-based synthetic stand-ins that preserve the
# properties the method exploits: multi-modal clustered density, anisotropic
# covariance, a uniform noise floor, and out-of-sample queries drawn from the
# same distribution (see DESIGN.md "Dataset substitution rationale").
# ---------------------------------------------------------------------------


def _gmm_vectors(
    g: np.random.Generator,
    n: int,
    d: int,
    n_components: int,
    *,
    spread: float = 10.0,
    scale_lo: float = 0.5,
    scale_hi: float = 2.0,
    noise_frac: float = 0.05,
    rank: int | None = None,
) -> np.ndarray:
    """Sample ``n`` points from an anisotropic Gaussian mixture in R^d.

    ``rank`` < d embeds the mixture on a low-rank manifold plus small ambient
    noise (the MNIST-like case). ``noise_frac`` of the points are uniform
    background noise so partitions cannot rely on pure cluster purity.
    """
    means = g.normal(0.0, spread, size=(n_components, d))
    # Per-component anisotropic axis scales.
    scales = g.uniform(scale_lo, scale_hi, size=(n_components, d))
    comp = g.integers(0, n_components, size=n)
    x = means[comp] + g.normal(0.0, 1.0, size=(n, d)) * scales[comp]
    if rank is not None and rank < d:
        proj = np.linalg.qr(g.normal(size=(d, rank)))[0]  # d x rank, orthonormal
        x = (x @ proj) @ proj.T + g.normal(0.0, 0.05, size=(n, d))
    n_noise = int(n * noise_frac)
    if n_noise:
        lo, hi = x.min(axis=0), x.max(axis=0)
        idx = g.choice(n, size=n_noise, replace=False)
        x[idx] = g.uniform(lo, hi, size=(n_noise, d))
    return x.astype(np.float64)


def sift_lite(
    *, n: int = 20_000, d: int = 32, n_queries: int = 1_000,
    n_components: int = 64, seed: int = 10,
) -> tuple[np.ndarray, np.ndarray]:
    """SIFT stand-in: many moderately separated anisotropic clusters.

    Returns ``(data, queries)`` numpy arrays; queries are fresh draws from the
    same mixture (paper: query distribution == data distribution).
    """
    g = _rng(seed)
    both = _gmm_vectors(g, n + n_queries, d, n_components)
    perm = g.permutation(n + n_queries)
    both = both[perm]
    return both[:n], both[n : n + n_queries]


def mnist_lite(
    *, n: int = 10_000, d: int = 64, n_queries: int = 500,
    n_components: int = 10, seed: int = 11,
) -> tuple[np.ndarray, np.ndarray]:
    """MNIST stand-in: few clusters on a low-rank manifold in high ambient d."""
    g = _rng(seed)
    both = _gmm_vectors(
        g, n + n_queries, d, n_components, spread=6.0, rank=max(8, d // 4)
    )
    perm = g.permutation(n + n_queries)
    both = both[perm]
    return both[:n], both[n : n + n_queries]


def vectors_df(spark: SparkSession, x: np.ndarray, *, id_offset: int = 0) -> DataFrame:
    """Wrap a numpy (n, d) matrix as a Spark DataFrame (id: long, vec: array<double>)."""
    pdf = pd.DataFrame(
        {"id": np.arange(id_offset, id_offset + len(x)), "vec": list(map(list, x))}
    )
    return spark.createDataFrame(pdf)


# --- 2D toy datasets (sklearn stand-ins) for the Table 5 clustering study ---


def moons(*, n: int = 1_000, noise: float = 0.05, seed: int = 12) -> tuple[np.ndarray, np.ndarray]:
    """Two interleaving half-circles; returns (points, labels)."""
    g = _rng(seed)
    n1 = n // 2
    n2 = n - n1
    t1 = np.pi * g.random(n1)
    t2 = np.pi * g.random(n2)
    x1 = np.c_[np.cos(t1), np.sin(t1)]
    x2 = np.c_[1.0 - np.cos(t2), 0.5 - np.sin(t2)]
    x = np.vstack([x1, x2]) + g.normal(0, noise, size=(n, 2))
    y = np.r_[np.zeros(n1, dtype=int), np.ones(n2, dtype=int)]
    perm = g.permutation(n)
    return x[perm], y[perm]


def circles(*, n: int = 1_000, factor: float = 0.5, noise: float = 0.05, seed: int = 13) -> tuple[np.ndarray, np.ndarray]:
    """Concentric circles; returns (points, labels)."""
    g = _rng(seed)
    n1 = n // 2
    n2 = n - n1
    t1 = 2 * np.pi * g.random(n1)
    t2 = 2 * np.pi * g.random(n2)
    x = np.vstack([np.c_[np.cos(t1), np.sin(t1)], factor * np.c_[np.cos(t2), np.sin(t2)]])
    x += g.normal(0, noise, size=(n, 2))
    y = np.r_[np.zeros(n1, dtype=int), np.ones(n2, dtype=int)]
    perm = g.permutation(n)
    return x[perm], y[perm]


def classification_blobs(
    *, n: int = 1_000, n_clusters: int = 4, d: int = 2, sep: float = 5.0,
    stretch: float = 8.0, seed: int = 14
) -> tuple[np.ndarray, np.ndarray]:
    """``make_classification``-style anisotropic clusters: parallel elongated
    "bars" stacked along their short axis, then rotated — the sklearn
    "anisotropicly distributed data" pitfall. K-means' spherical bias cuts
    the bars lengthwise; density/graph methods separate them cleanly.

    ``sep`` is the bar half-length, ``stretch`` scales the gap:bar-width
    ratio. Extra dims (d > 2) get thin normal noise.
    """
    g = _rng(seed)
    w = 0.25
    gap = w * 10.0 * (stretch / 8.0)
    y = g.integers(0, n_clusters, size=n)
    u = g.uniform(-sep, sep, n)
    v = g.normal(0, w, n) + y * gap
    x = np.c_[u, v, g.normal(0, w, size=(n, d - 2))] if d > 2 else np.c_[u, v]
    theta = 0.6
    rot = np.eye(d)
    rot[:2, :2] = [[np.cos(theta), -np.sin(theta)], [np.sin(theta), np.cos(theta)]]
    return x @ rot, y
