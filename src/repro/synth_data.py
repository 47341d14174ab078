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


# --------------------------------------------------------------------------
# Data-series generators (Odyssey reproduction).
#
# The paper's datasets (Table 1) are random walks ("Random") and real sets
# with heavy density skew and variable query difficulty (Seismic etc.).
# These generators reproduce those properties at laptop scale; all series
# are z-normalised so the index, the Spark engine, and the DuckDB oracle
# operate in the same metric space.
# --------------------------------------------------------------------------


def _znorm_rows(x: np.ndarray, eps: float = 1e-8) -> np.ndarray:
    mu = x.mean(axis=1, keepdims=True)
    sd = x.std(axis=1, keepdims=True)
    return (x - mu) / np.maximum(sd, eps)


def random_walk_np(n: int, length: int, *, seed: int = 0) -> np.ndarray:
    """Random-walk series (cumulative Gaussian steps), z-normalised.

    This is the paper's "Random" dataset (models stock-market prices)."""
    g = _rng(seed)
    return _znorm_rows(np.cumsum(g.standard_normal((n, length)), axis=1))


def clustered_walks_np(
    n: int,
    length: int,
    *,
    n_clusters: int = 12,
    within_scale: float = 0.25,
    size_alpha: float = 1.2,
    seed: int = 0,
) -> np.ndarray:
    """Density-skewed series: random-walk cluster templates plus small
    within-cluster noise-walks; cluster sizes follow a Zipf law and the
    rows are ordered cluster-by-cluster.

    The cluster ordering matters: it emulates real datasets written to
    disk in acquisition order, so a contiguous EQUALLY-SPLIT partitioning
    concentrates similar series on one node — exactly the pathology the
    paper's DENSITY-AWARE partitioner fixes. This is the "seismic-like"
    dataset of the reproduction."""
    g = _rng(seed)
    ranks = np.arange(1, n_clusters + 1)
    weights = 1.0 / ranks**size_alpha
    weights /= weights.sum()
    sizes = np.maximum(1, (weights * n).astype(int))
    while sizes.sum() < n:
        sizes[0] += 1
    while sizes.sum() > n:
        sizes[np.argmax(sizes)] -= 1
    rows = []
    for c in range(n_clusters):
        template = np.cumsum(g.standard_normal(length))
        noise = np.cumsum(g.standard_normal((sizes[c], length)) * within_scale, axis=1)
        rows.append(template + noise)
    return _znorm_rows(np.vstack(rows))


def make_queries_np(
    data: np.ndarray,
    n_queries: int,
    *,
    noise_sigmas=(0.05, 0.1, 0.25, 0.5, 1.0),
    hard_frac: float = 0.1,
    seed: int = 0,
) -> tuple[np.ndarray, pd.DataFrame]:
    """Query workload with variable difficulty.

    Most queries are dataset series perturbed by Gaussian noise drawn from
    a σ ladder (easy→moderate); ``hard_frac`` of them are fresh random
    walks (out-of-distribution ⇒ high initial BSF ⇒ little pruning), the
    kind of query that dominates the makespan in the paper's scheduling
    and work-stealing experiments. Returns ``(queries, meta)`` where meta
    has per-query ``sigma`` and ``is_hard``."""
    g = _rng(seed)
    n, length = data.shape
    queries = np.empty((n_queries, length))
    sigmas = np.empty(n_queries)
    hard = np.zeros(n_queries, dtype=bool)
    for i in range(n_queries):
        if g.random() < hard_frac:
            queries[i] = np.cumsum(g.standard_normal(length))
            sigmas[i] = np.nan
            hard[i] = True
        else:
            base = data[g.integers(0, n)]
            s = float(g.choice(noise_sigmas))
            queries[i] = base + g.standard_normal(length) * s
            sigmas[i] = s
    meta = pd.DataFrame({"query_id": np.arange(n_queries), "sigma": sigmas, "is_hard": hard})
    return _znorm_rows(queries), meta


def series_df(spark: SparkSession, data: np.ndarray, ids: np.ndarray | None = None) -> DataFrame:
    """Spark DataFrame ``(id: long, series: array<double>)`` for a series set."""
    data = np.asarray(data, dtype=np.float64)
    if ids is None:
        ids = np.arange(len(data))
    pdf = pd.DataFrame({"id": np.asarray(ids, dtype=np.int64), "series": list(data)})
    return spark.createDataFrame(pdf)


def series_long_pdf(data: np.ndarray, ids: np.ndarray | None = None, *, id_col: str = "id") -> pd.DataFrame:
    """Long format ``(id, pos, val)`` — the shape the DuckDB oracle joins on."""
    data = np.asarray(data, dtype=np.float64)
    n, length = data.shape
    if ids is None:
        ids = np.arange(n)
    return pd.DataFrame(
        {
            id_col: np.repeat(np.asarray(ids, dtype=np.int64), length),
            "pos": np.tile(np.arange(length), n),
            "val": data.ravel(),
        }
    )
