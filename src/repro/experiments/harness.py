"""Experiment harness — one function per evaluation table (DESIGN.md §4).

Each function runs the real Spark engine to *measure* per-(chunk, query)
work, feeds the deterministic makespan simulator for cluster-level times,
and returns a tidy pandas DataFrame (also printed), whose rows are the
numbers behind the corresponding paper figure/table. Times are reported
in mega-cost-units (1e6 flop-ish units of measured work / n_threads);
absolute values are not comparable to the paper's seconds, shapes are.
"""
import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from ..baselines.dmessi import dmessi_search, dmessi_swbsf_search
from ..baselines.dpisax import dpisax_partition, dpisax_search
from ..distributed.engine import DistResult, build_only, distributed_search
from ..distributed.partitioning import density_aware, equally_split
from ..distributed.replication import ReplicationConfig, supported_degrees
from ..scheduling.predictor import LinearPredictor, fit_predictor
from ..scheduling.schedulers import (
    ALL_POLICIES,
    PREDICT_DN,
    STATIC,
    WORK_STEAL,
    WORK_STEAL_PREDICT,
)
from ..scheduling.simulator import simulate_cluster, works_from_stats
from ..synth_data import make_queries_np, series_df
from .datasets import DATASETS

UNIT = 1e6  # mega cost units


def _print_table(df: pd.DataFrame, title: str) -> pd.DataFrame:
    print(f"\n== {title} ==")
    print(df.to_string(index=False))
    return df


def chunked_df(
    spark: SparkSession,
    data: np.ndarray,
    n_chunks: int,
    *,
    scheme: str = "equal",
    shuffle: bool = False,
):
    """Series DataFrame with a chunk assignment under the given scheme."""
    df = series_df(spark, data)
    if scheme == "equal":
        return equally_split(df, n_chunks, shuffle=shuffle)
    if scheme == "density":
        return density_aware(df, n_chunks)
    if scheme == "dpisax":
        return dpisax_partition(df, n_chunks)
    raise ValueError(f"unknown scheme {scheme!r}")


def fit_chunk_predictors(
    train: DistResult, *, n_threads: int = 8
) -> dict[int, LinearPredictor]:
    """Per-chunk linear BSF→cost predictors from a training run."""
    out = {}
    for chunk, grp in train.chunk_stats.groupby("chunk_id"):
        out[int(chunk)] = fit_predictor(
            grp["approx_bsf"].to_numpy(), grp["total_cost"].to_numpy() / n_threads
        )
    return out


def chunk_predictions(
    result: DistResult, predictors: dict[int, LinearPredictor]
) -> dict[int, np.ndarray]:
    """Predicted per-query node-times, aligned with query_id order."""
    out = {}
    for chunk, grp in result.chunk_stats.groupby("chunk_id"):
        grp = grp.sort_values("query_id")
        out[int(chunk)] = predictors[int(chunk)].predict(grp["approx_bsf"].to_numpy())
    return out


def _index_times(stats: pd.DataFrame, *, n_threads: int = 8) -> dict[str, float]:
    """Buffer/tree/index node-times (max over chunks) from engine stats."""
    per = stats.groupby("chunk_id")[["buffer_cost", "tree_cost"]].first()
    buffer_t = float(per["buffer_cost"].max()) / n_threads / UNIT
    tree_t = float(per["tree_cost"].max()) / n_threads / UNIT
    return {"buffer_time": buffer_t, "tree_time": tree_t, "index_time": buffer_t + tree_t}


def _makespan(
    result: DistResult,
    config: ReplicationConfig,
    policy: str,
    *,
    predictions: dict[int, np.ndarray] | None = None,
    n_threads: int = 8,
    seed: int = 0,
):
    works = works_from_stats(result.chunk_stats, n_threads=n_threads)
    sim = simulate_cluster(
        works, config, policy, predictions_by_chunk=predictions, seed=seed
    )
    return sim


# ---------------------------------------------------------------- T1 (Table 1)


def dataset_table(sf: float = 1.0) -> pd.DataFrame:
    """Table 1 at mini scale: our generated sizes next to the paper's."""
    rows = []
    for key, spec in DATASETS.items():
        data = spec.generate(sf)
        rows.append(
            {
                "dataset": spec.name,
                "ours_n_series": len(data),
                "ours_length": data.shape[1],
                "ours_mb": round(data.astype(np.float32).nbytes / 1e6, 2),
                "paper_n_series": spec.paper_series,
                "paper_length": spec.paper_length,
                "paper_gb": spec.paper_gb,
                "description": spec.description,
            }
        )
    return _print_table(pd.DataFrame(rows), "T1: datasets (paper Table 1)")


# ------------------------------------------------------------- E2 (Fig 10)


def scheduling_experiment(
    spark: SparkSession,
    *,
    n_nodes_list=(1, 2, 4, 8, 16),
    n_queries: int = 100,
    n_train: int = 40,
    n_series: int = 3000,
    length: int = 64,
    policies=tuple(ALL_POLICIES),
    n_threads: int = 8,
    seed: int = 0,
) -> pd.DataFrame:
    """Scheduling policies under FULL replication (seismic-like queries of
    varying difficulty), makespan vs number of nodes."""
    data = DATASETS["seismic"].generate(n_series / DATASETS["seismic"].base_n)
    data = data[:n_series]
    queries, _ = make_queries_np(data, n_queries, seed=seed)
    train_q, _ = make_queries_np(data, n_train, seed=seed + 1000)
    cdf = chunked_df(spark, data, 1)
    train = distributed_search(cdf, train_q, n_threads=n_threads)
    predictors = fit_chunk_predictors(train, n_threads=n_threads)
    run = distributed_search(cdf, queries, n_threads=n_threads)
    preds = chunk_predictions(run, predictors)
    rows = []
    for n in n_nodes_list:
        cfg = ReplicationConfig(n, 1)  # FULL
        for policy in policies:
            sim = _makespan(run, cfg, policy, predictions=preds, n_threads=n_threads)
            rows.append(
                {
                    "policy": policy,
                    "n_nodes": n,
                    "query_time": sim.makespan / UNIT,
                    "n_steals": sim.n_steals,
                }
            )
    df = pd.DataFrame(rows)
    return _print_table(df, "E2: scheduling policies, FULL replication (paper Fig 10)")


# ------------------------------------------------------------- E3 (Fig 11)


def query_scalability(
    spark: SparkSession,
    *,
    j_list=(1, 2, 4, 8),
    base_queries: int = 100,
    n_series: int = 3000,
    n_threads: int = 8,
    seed: int = 0,
) -> pd.DataFrame:
    """j·base queries on j nodes (FULL, WORK-STEAL) ≈ constant time; plus
    the PARTIAL-2 variant for j ≥ 2."""
    data = DATASETS["random"].generate(n_series / DATASETS["random"].base_n)[:n_series]
    max_q = base_queries * max(j_list)
    queries, _ = make_queries_np(data, max_q, seed=seed)
    full = distributed_search(chunked_df(spark, data, 1), queries, n_threads=n_threads)
    part2 = distributed_search(chunked_df(spark, data, 2), queries, n_threads=n_threads)
    rows = []
    for j in j_list:
        n_q = base_queries * j
        for name, res, k in (("FULL", full, 1), ("PARTIAL-2", part2, 2)):
            if j < k:
                continue
            sliced = DistResult(
                chunk_stats=res.chunk_stats[res.chunk_stats["query_id"] < n_q],
                answers=res.answers,
                k=res.k,
            )
            sim = _makespan(sliced, ReplicationConfig(j, k), WORK_STEAL, n_threads=n_threads)
            rows.append(
                {
                    "replication": name,
                    "n_nodes": j,
                    "n_queries": n_q,
                    "query_time": sim.makespan / UNIT,
                }
            )
    return _print_table(pd.DataFrame(rows), "E3: query scalability (paper Fig 11)")


# ------------------------------------------------------------- E4 (Fig 12)


def datasize_scalability(
    spark: SparkSession,
    *,
    multipliers=(1, 2, 4, 8),
    base_n: int = 1000,
    n_queries: int = 50,
    n_nodes: int = 8,
    n_threads: int = 8,
    seed: int = 0,
) -> pd.DataFrame:
    """Query time for a fixed batch as the dataset grows, 8 nodes, every
    replication strategy."""
    rows = []
    for mult in multipliers:
        n = base_n * mult
        data = DATASETS["random"].generate(n / DATASETS["random"].base_n, seed=seed + mult)[:n]
        queries, _ = make_queries_np(data, n_queries, seed=seed)
        for cfg in supported_degrees(n_nodes):
            res = distributed_search(
                chunked_df(spark, data, cfg.n_chunks), queries, n_threads=n_threads
            )
            sim = _makespan(res, cfg, WORK_STEAL, n_threads=n_threads)
            rows.append(
                {
                    "n_series": n,
                    "strategy": cfg.name,
                    "query_time": sim.makespan / UNIT,
                }
            )
    return _print_table(pd.DataFrame(rows), "E4: query time vs data size (paper Fig 12)")


# ------------------------------------------------------------- E5 (Fig 13)


def throughput(
    spark: SparkSession,
    *,
    n_nodes_list=(1, 2, 4, 8, 16),
    n_queries: int = 200,
    n_series: int = 3000,
    n_threads: int = 8,
    seed: int = 0,
) -> pd.DataFrame:
    """WORK-STEAL throughput (queries per unit time) vs nodes, FULL."""
    data = DATASETS["random"].generate(n_series / DATASETS["random"].base_n)[:n_series]
    queries, _ = make_queries_np(data, n_queries, seed=seed)
    res = distributed_search(chunked_df(spark, data, 1), queries, n_threads=n_threads)
    rows = []
    for n in n_nodes_list:
        sim = _makespan(res, ReplicationConfig(n, 1), WORK_STEAL, n_threads=n_threads)
        rows.append(
            {
                "n_nodes": n,
                "query_time": sim.makespan / UNIT,
                "throughput": n_queries / (sim.makespan / UNIT),
            }
        )
    return _print_table(pd.DataFrame(rows), "E5: query throughput (paper Fig 13)")


# ------------------------------------------------------------- E6 (Fig 14)


def index_size_table(
    spark: SparkSession,
    *,
    n_nodes: int = 8,
    sf: float = 0.5,
    datasets=("seismic", "astro", "deep", "sift", "yantti", "random"),
) -> pd.DataFrame:
    """Total index size per replication strategy (8 nodes), per dataset."""
    rows = []
    for key in datasets:
        spec = DATASETS[key]
        data = spec.generate(sf)
        data_mb = data.astype(np.float32).nbytes / 1e6
        for cfg in supported_degrees(n_nodes):
            stats = build_only(chunked_df(spark, data, cfg.n_chunks))
            per_chunk = dict(zip(stats["chunk_id"], stats["index_bytes"]))
            rows.append(
                {
                    "dataset": spec.name,
                    "strategy": cfg.name,
                    "index_mb": cfg.total_index_bytes(per_chunk) / 1e6,
                    "data_mb": data_mb,
                }
            )
    return _print_table(pd.DataFrame(rows), "E6: index size (paper Fig 14)")


# ---------------------------------------------------------- E7 (Fig 15/16)


def replication_tradeoff(
    spark: SparkSession,
    *,
    n_queries_list=(100, 200, 400, 800),
    n_series: int = 3000,
    n_nodes: int = 8,
    n_train: int = 40,
    n_threads: int = 8,
    dataset: str = "seismic",
    seed: int = 0,
) -> pd.DataFrame:
    """Query time vs total (index + query) time across replication
    strategies and batch sizes, WORK-STEAL-PREDICT."""
    spec = DATASETS[dataset]
    data = spec.generate(n_series / spec.base_n, seed=seed)[:n_series]
    max_q = max(n_queries_list)
    queries, _ = make_queries_np(data, max_q, seed=seed)
    train_q, _ = make_queries_np(data, n_train, seed=seed + 1000)
    rows = []
    for cfg in supported_degrees(n_nodes):
        cdf = chunked_df(spark, data, cfg.n_chunks)
        train = distributed_search(cdf, train_q, n_threads=n_threads)
        predictors = fit_chunk_predictors(train, n_threads=n_threads)
        res = distributed_search(cdf, queries, n_threads=n_threads)
        preds = chunk_predictions(res, predictors)
        times = _index_times(res.chunk_stats, n_threads=n_threads)
        for n_q in n_queries_list:
            sliced = DistResult(
                chunk_stats=res.chunk_stats[res.chunk_stats["query_id"] < n_q],
                answers=res.answers,
                k=res.k,
            )
            preds_sliced = {c: p[:n_q] for c, p in preds.items()}
            sim = _makespan(
                sliced, cfg, WORK_STEAL_PREDICT, predictions=preds_sliced, n_threads=n_threads
            )
            q_time = sim.makespan / UNIT
            rows.append(
                {
                    "strategy": cfg.name,
                    "n_queries": n_q,
                    "query_time": q_time,
                    "index_time": times["index_time"],
                    "total_time": times["index_time"] + q_time,
                }
            )
    return _print_table(
        pd.DataFrame(rows), "E7: replication trade-off (paper Fig 15/16)"
    )


# ---------------------------------------------------------- E8 (Fig 17a-c)


def index_scalability(
    spark: SparkSession,
    *,
    base_n: int = 2000,
    multipliers=(1, 2, 4, 8),
    n_nodes_list=(1, 2, 4, 8, 16),
    n_threads: int = 8,
    seed: int = 0,
) -> pd.DataFrame:
    """Index build scalability (EQUALLY-SPLIT): (a) size sweep at 16 nodes,
    (b) node sweep at fixed size, (c) size and nodes growing together."""
    rows = []
    deep = DATASETS["deep"]
    for mult in multipliers:  # (a)
        n = base_n * mult
        data = deep.generate(n / deep.base_n, seed=seed + mult)[:n]
        stats = build_only(chunked_df(spark, data, 16))
        t = (stats["buffer_cost"] + stats["tree_cost"]).max() / n_threads / UNIT
        rows.append({"sweep": "size@16nodes", "n_series": n, "n_nodes": 16, "index_time": t})
    n = base_n * max(multipliers)
    data = deep.generate(n / deep.base_n, seed=seed)[:n]
    for nodes in n_nodes_list:  # (b)
        stats = build_only(chunked_df(spark, data, nodes))
        t = (stats["buffer_cost"] + stats["tree_cost"]).max() / n_threads / UNIT
        rows.append({"sweep": "nodes@fixed", "n_series": n, "n_nodes": nodes, "index_time": t})
    rnd = DATASETS["random"]
    for mult in multipliers:  # (c)
        n = base_n * mult
        data = rnd.generate(n / rnd.base_n, seed=seed + 10 + mult)[:n]
        stats = build_only(chunked_df(spark, data, mult))
        per = stats[["buffer_cost", "tree_cost"]].max()
        rows.append(
            {
                "sweep": "size+nodes",
                "n_series": n,
                "n_nodes": mult,
                "index_time": (per["buffer_cost"] + per["tree_cost"]) / n_threads / UNIT,
            }
        )
    return _print_table(pd.DataFrame(rows), "E8: index scalability (paper Fig 17a-c)")


# ------------------------------------------------------------ E9 (Fig 17d)


def competitors(
    spark: SparkSession,
    *,
    n_nodes: int = 8,
    n_queries: int = 60,
    n_train: int = 30,
    n_series: int = 3000,
    n_threads: int = 8,
    dataset: str = "seismic",
    seed: int = 0,
) -> tuple[pd.DataFrame, dict[str, DistResult]]:
    """Odyssey (FULL / DENSITY-AWARE / EQUALLY-SPLIT) vs DMESSI,
    DMESSI-SW-BSF and DPiSAX. Returns the table and the raw results so
    tests can check all algorithms agree on the answers."""
    spec = DATASETS[dataset]
    data = spec.generate(n_series / spec.base_n, seed=seed)[:n_series]
    queries, _ = make_queries_np(data, n_queries, seed=seed)
    train_q, _ = make_queries_np(data, n_train, seed=seed + 1000)

    results: dict[str, DistResult] = {}
    rows = []

    # Odyssey FULL + WORK-STEAL-PREDICT
    cdf1 = chunked_df(spark, data, 1)
    train = distributed_search(cdf1, train_q, n_threads=n_threads)
    predictors = fit_chunk_predictors(train, n_threads=n_threads)
    res = distributed_search(cdf1, queries, n_threads=n_threads)
    preds = chunk_predictions(res, predictors)
    sim = _makespan(
        res, ReplicationConfig(n_nodes, 1), WORK_STEAL_PREDICT,
        predictions=preds, n_threads=n_threads,
    )
    results["ODYSSEY-FULL"] = res
    rows.append({"algorithm": "ODYSSEY-FULL", "query_time": sim.makespan / UNIT})

    no_rep = ReplicationConfig(n_nodes, n_nodes)
    for name, scheme, fn, share in (
        ("ODYSSEY-DENSITY-AWARE", "density", distributed_search, True),
        ("ODYSSEY-EQUALLY-SPLIT", "equal", distributed_search, True),
        ("DMESSI", "equal", dmessi_search, None),
        ("DMESSI-SW-BSF", "equal", dmessi_swbsf_search, None),
        ("DPISAX", "dpisax", dpisax_search, None),
    ):
        cdf = chunked_df(spark, data, n_nodes, scheme=scheme)
        kwargs = {"n_threads": n_threads}
        if share is not None:
            kwargs["share_bsf"] = share
        res = fn(cdf, queries, **kwargs)
        sim = _makespan(res, no_rep, STATIC, n_threads=n_threads)
        results[name] = res
        rows.append({"algorithm": name, "query_time": sim.makespan / UNIT})

    df = pd.DataFrame(rows)
    best_odyssey = df[df["algorithm"].str.startswith("ODYSSEY")]["query_time"].min()
    df["speedup_vs_odyssey_best"] = df["query_time"] / best_odyssey
    return _print_table(df, "E9: comparison to competitors (paper Fig 17d)"), results


# ------------------------------------------------------------ E10 (Fig 18)


def knn_experiment(
    spark: SparkSession,
    *,
    k: int = 10,
    n_nodes_list=(2, 4, 8),
    n_queries: int = 30,
    n_series: int = 2000,
    n_threads: int = 8,
    seed: int = 0,
) -> pd.DataFrame:
    """k-NN (k=10) query time vs nodes for each replication strategy."""
    data = DATASETS["random"].generate(n_series / DATASETS["random"].base_n)[:n_series]
    queries, _ = make_queries_np(data, n_queries, seed=seed)
    rows = []
    cache: dict[int, DistResult] = {}
    for n in n_nodes_list:
        for cfg in supported_degrees(n):
            if cfg.n_chunks not in cache:
                cache[cfg.n_chunks] = distributed_search(
                    chunked_df(spark, data, cfg.n_chunks), queries, k=k, n_threads=n_threads
                )
            sim = _makespan(cache[cfg.n_chunks], cfg, WORK_STEAL, n_threads=n_threads)
            rows.append(
                {
                    "n_nodes": n,
                    "strategy": cfg.name,
                    "k": k,
                    "query_time": sim.makespan / UNIT,
                }
            )
    return _print_table(pd.DataFrame(rows), "E10: 10-NN query answering (paper Fig 18)")


# ------------------------------------------------------------ E11 (Fig 19)


def dtw_experiment(
    spark: SparkSession,
    *,
    warp: float = 0.05,
    n_nodes_list=(2, 4, 8),
    n_queries: int = 20,
    n_series: int = 1500,
    n_threads: int = 8,
    seed: int = 0,
) -> pd.DataFrame:
    """DTW (5% warping) query time vs nodes for each replication strategy."""
    data = DATASETS["random"].generate(n_series / DATASETS["random"].base_n)[:n_series]
    queries, _ = make_queries_np(data, n_queries, seed=seed)
    rows = []
    cache: dict[int, DistResult] = {}
    for n in n_nodes_list:
        for cfg in supported_degrees(n):
            if cfg.n_chunks not in cache:
                cache[cfg.n_chunks] = distributed_search(
                    chunked_df(spark, data, cfg.n_chunks),
                    queries,
                    distance="dtw",
                    warp=warp,
                    n_threads=n_threads,
                )
            sim = _makespan(cache[cfg.n_chunks], cfg, WORK_STEAL, n_threads=n_threads)
            rows.append(
                {
                    "n_nodes": n,
                    "strategy": cfg.name,
                    "warp": warp,
                    "query_time": sim.makespan / UNIT,
                }
            )
    return _print_table(pd.DataFrame(rows), "E11: DTW 5% warping (paper Fig 19)")
