"""The Odyssey distributed search operator on Spark.

The dataset is a DataFrame ``(id, series, chunk_id)`` (chunk = the data a
replication group indexes). Query answering is a grouped scan:
``groupBy(chunk_id).applyInPandas`` builds the chunk's iSAX index and
answers the *whole query batch* against it — one "node" execution per
chunk, run in parallel by Spark. BSF sharing is a two-pass dataflow:

  pass 1  approximate search per chunk  →  driver reduces to a global
          per-query k-BSF seed (the paper's BSF-sharing channel)
  pass 2  exact search seeded with the global BSF (broadcast in the
          task closure)

The operator returns per-(chunk, query) answers *and* the full work
breakdown (lower-bound counts, real-distance counts, priority-queue cost
decomposition), which the cluster-level makespan simulator consumes —
see DESIGN.md §1 for why cross-node wall-clock is simulated from
measured work rather than taken from local Spark timings.
"""
import json
import time
from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import types as T

from ..core.dtw import exact_search_dtw
from ..core.index import approx_search, build_index
from ..core.paa import paa
from ..core.search import exact_search

RESULT_SCHEMA = T.StructType(
    [
        T.StructField("chunk_id", T.LongType()),
        T.StructField("query_id", T.LongType()),
        T.StructField("nn_dist", T.DoubleType()),
        T.StructField("nn_id", T.LongType()),
        T.StructField("topk", T.StringType()),  # json [[dist, id], ...]
        T.StructField("approx_bsf", T.DoubleType()),
        T.StructField("buffer_cost", T.DoubleType()),
        T.StructField("tree_cost", T.DoubleType()),
        T.StructField("index_bytes", T.LongType()),
        T.StructField("n_leaves", T.LongType()),
        T.StructField("n_series", T.LongType()),
        T.StructField("build_elapsed", T.DoubleType()),
        T.StructField("t_serial", T.DoubleType()),  # cost units, non-stealable
        T.StructField("pq_costs", T.StringType()),  # json [cost, ...]
        T.StructField("leaf_lb", T.LongType()),
        T.StructField("series_lb", T.LongType()),
        T.StructField("real_series", T.LongType()),
        T.StructField("total_cost", T.DoubleType()),
        T.StructField("thread_time", T.DoubleType()),
        T.StructField("elapsed", T.DoubleType()),
    ]
)

DEFAULT_INDEX_PARAMS = {"w": 8, "max_bits": 8, "leaf_capacity": 64}


@dataclass
class DistResult:
    """Distributed search output: raw per-chunk stats + merged answers."""

    chunk_stats: pd.DataFrame
    answers: pd.DataFrame  # k=1: (query_id, nn_dist, nn_id); k>1: + rank
    k: int


def _make_worker(
    queries: np.ndarray,
    *,
    approx_only: bool,
    seeds: np.ndarray | None,
    algorithm: str,
    distance: str,
    warp: float,
    k: int,
    n_threads: int,
    index_params: dict,
):
    """Build the per-chunk pandas worker (closure ships queries + seeds)."""
    if algorithm == "odyssey":
        search_kw = {"sorted_pqs": True, "pq_threshold": 64}
    elif algorithm == "messi":
        search_kw = {"sorted_pqs": False, "pq_threshold": None}
    else:
        raise ValueError(f"unknown algorithm {algorithm!r}")

    def fn(pdf: pd.DataFrame) -> pd.DataFrame:
        chunk_id = int(pdf["chunk_id"].iloc[0])
        data = np.stack(pdf["series"].to_numpy()).astype(np.float64)
        ids = pdf["id"].to_numpy(dtype=np.int64)
        t0 = time.perf_counter()
        index = build_index(ids, data, **index_params)
        build_elapsed = time.perf_counter() - t0
        base = {
            "chunk_id": chunk_id,
            "buffer_cost": index.buffer_cost,
            "tree_cost": index.tree_cost,
            "index_bytes": index.index_bytes(),
            "n_leaves": index.n_leaves,
            "n_series": index.n_series,
            "build_elapsed": build_elapsed,
        }
        rows = []
        for qi in range(len(queries)):
            q = queries[qi]
            t1 = time.perf_counter()
            if approx_only:
                q_paa = paa(q, index.w)
                bsf, nn_id, dists, member_ids, cost = approx_search(index, q, q_paa)
                order = np.argsort(dists)[:k]
                topk = [[float(dists[i]), int(member_ids[i])] for i in order]
                rows.append(
                    {
                        **base,
                        "query_id": qi,
                        "nn_dist": float(bsf),
                        "nn_id": int(nn_id),
                        "topk": json.dumps(topk),
                        "approx_bsf": float(bsf),
                        "t_serial": cost,
                        "pq_costs": "[]",
                        "leaf_lb": index.n_leaves,
                        "series_lb": 0,
                        "real_series": len(member_ids),
                        "total_cost": cost,
                        "thread_time": cost / max(1, n_threads),
                        "elapsed": time.perf_counter() - t1,
                    }
                )
                continue
            seed = float(seeds[qi]) if seeds is not None else np.inf
            if distance == "ed":
                st = exact_search(
                    index, q, k=k, init_bsf=seed, n_threads=n_threads, **search_kw
                )
            elif distance == "dtw":
                st = exact_search_dtw(
                    index, q, k=k, warp=warp, init_bsf=seed,
                    n_threads=n_threads, **search_kw,
                )
            else:
                raise ValueError(f"unknown distance {distance!r}")
            rows.append(
                {
                    **base,
                    "query_id": qi,
                    "nn_dist": float(st.nn_dist),
                    "nn_id": int(st.nn_id),
                    "topk": json.dumps([[float(d), int(i)] for d, i in st.topk]),
                    "approx_bsf": float(st.approx_bsf),
                    "t_serial": st.approx_cost + st.traversal_cost,
                    "pq_costs": json.dumps([float(c) for c in st.pq_costs]),
                    "leaf_lb": int(st.leaf_lb),
                    "series_lb": int(st.series_lb),
                    "real_series": int(st.real_series),
                    "total_cost": float(st.total_cost),
                    "thread_time": float(st.thread_time),
                    "elapsed": time.perf_counter() - t1,
                }
            )
        out = pd.DataFrame(rows)
        return out[[f.name for f in RESULT_SCHEMA.fields]]

    return fn


def chunk_search(
    chunked_df: DataFrame,
    queries: np.ndarray,
    *,
    approx_only: bool = False,
    seeds: np.ndarray | None = None,
    algorithm: str = "odyssey",
    distance: str = "ed",
    warp: float = 0.05,
    k: int = 1,
    n_threads: int = 8,
    index_params: dict | None = None,
) -> pd.DataFrame:
    """One grouped-scan pass: per-chunk index build + batch query answering."""
    params = dict(DEFAULT_INDEX_PARAMS, **(index_params or {}))
    fn = _make_worker(
        np.asarray(queries, dtype=np.float64),
        approx_only=approx_only,
        seeds=seeds,
        algorithm=algorithm,
        distance=distance,
        warp=warp,
        k=k,
        n_threads=n_threads,
        index_params=params,
    )
    sdf = chunked_df.select("chunk_id", "id", "series").groupBy("chunk_id").applyInPandas(
        fn, RESULT_SCHEMA
    )
    return sdf.toPandas()


def _merge_answers(stats: pd.DataFrame, k: int) -> pd.DataFrame:
    """Coordinator merge: global (k-)NN across chunks' partial answers."""
    if k == 1:
        best = stats.sort_values(["query_id", "nn_dist", "nn_id"]).groupby(
            "query_id", as_index=False
        ).first()
        return best[["query_id", "nn_dist", "nn_id"]].reset_index(drop=True)
    rows = []
    for _, r in stats.iterrows():
        for dist, sid in json.loads(r["topk"]):
            rows.append((int(r["query_id"]), float(dist), int(sid)))
    pool = pd.DataFrame(rows, columns=["query_id", "nn_dist", "nn_id"])
    pool = pool.sort_values(["query_id", "nn_dist", "nn_id"]).groupby("query_id").head(k)
    pool["rank"] = pool.groupby("query_id").cumcount() + 1
    return pool[["query_id", "rank", "nn_dist", "nn_id"]].reset_index(drop=True)


def _seeds_from_approx(approx: pd.DataFrame, n_queries: int, k: int) -> np.ndarray:
    """Global per-query k-BSF seed = k-th best pooled approximate distance."""
    seeds = np.full(n_queries, np.inf)
    for qid, grp in approx.groupby("query_id"):
        dists: list[float] = []
        for tk in grp["topk"]:
            dists.extend(d for d, _ in json.loads(tk))
        dists.sort()
        if len(dists) >= k:
            seeds[int(qid)] = dists[k - 1]
    return seeds


def distributed_search(
    chunked_df: DataFrame,
    queries: np.ndarray,
    *,
    share_bsf: bool = True,
    algorithm: str = "odyssey",
    distance: str = "ed",
    warp: float = 0.05,
    k: int = 1,
    n_threads: int = 8,
    index_params: dict | None = None,
) -> DistResult:
    """End-to-end distributed exact (k-)NN search over a chunked dataset.

    ``share_bsf=False`` reproduces the DMESSI behaviour (each chunk prunes
    with its local approximate BSF only)."""
    queries = np.asarray(queries, dtype=np.float64)
    seeds = None
    extra_cost = None
    if share_bsf:
        approx = chunk_search(
            chunked_df, queries, approx_only=True, k=k,
            n_threads=n_threads, index_params=index_params,
        )
        seeds = _seeds_from_approx(approx, len(queries), k)
        extra_cost = approx.groupby(["chunk_id", "query_id"])["total_cost"].sum()
    stats = chunk_search(
        chunked_df,
        queries,
        seeds=seeds,
        algorithm=algorithm,
        distance=distance,
        warp=warp,
        k=k,
        n_threads=n_threads,
        index_params=index_params,
    )
    if extra_cost is not None:
        # the approximate pass is real work a node performs; fold it into
        # the non-stealable part of the exact pass for the simulator
        key = stats.set_index(["chunk_id", "query_id"]).index
        stats["t_serial"] = stats["t_serial"].to_numpy() + extra_cost.reindex(key).fillna(0).to_numpy()
        stats["total_cost"] = stats["total_cost"].to_numpy() + extra_cost.reindex(key).fillna(0).to_numpy()
    return DistResult(chunk_stats=stats, answers=_merge_answers(stats, k), k=k)


def build_only(chunked_df: DataFrame, *, index_params: dict | None = None) -> pd.DataFrame:
    """Per-chunk index build statistics without answering any query."""
    params = dict(DEFAULT_INDEX_PARAMS, **(index_params or {}))

    schema = T.StructType(
        [
            T.StructField("chunk_id", T.LongType()),
            T.StructField("n_series", T.LongType()),
            T.StructField("n_leaves", T.LongType()),
            T.StructField("buffer_cost", T.DoubleType()),
            T.StructField("tree_cost", T.DoubleType()),
            T.StructField("index_bytes", T.LongType()),
            T.StructField("build_elapsed", T.DoubleType()),
        ]
    )

    def fn(pdf: pd.DataFrame) -> pd.DataFrame:
        data = np.stack(pdf["series"].to_numpy()).astype(np.float64)
        ids = pdf["id"].to_numpy(dtype=np.int64)
        t0 = time.perf_counter()
        index = build_index(ids, data, **params)
        return pd.DataFrame(
            [
                {
                    "chunk_id": int(pdf["chunk_id"].iloc[0]),
                    "n_series": index.n_series,
                    "n_leaves": index.n_leaves,
                    "buffer_cost": index.buffer_cost,
                    "tree_cost": index.tree_cost,
                    "index_bytes": index.index_bytes(),
                    "build_elapsed": time.perf_counter() - t0,
                }
            ]
        )

    return (
        chunked_df.select("chunk_id", "id", "series")
        .groupBy("chunk_id")
        .applyInPandas(fn, schema)
        .toPandas()
        .sort_values("chunk_id")
        .reset_index(drop=True)
    )
