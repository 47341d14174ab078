"""Data partitioning (paper §3.4): EQUALLY-SPLIT and DENSITY-AWARE.

Both take a series DataFrame ``(id, series)`` and return it with a
``chunk_id`` column in ``[0, n_chunks)``. EQUALLY-SPLIT assigns contiguous
ranges in storage order (optionally after random shuffling, the paper's
"RS"). DENSITY-AWARE orders the summarization buffers by Gray code,
stripes the λ largest buffers across all chunks series-by-series, assigns
the remaining buffers round-robin in Gray order, and rebalances by
striping the largest buffer of the most loaded chunk until chunk loads
are within tolerance — so similar series end up on *different* nodes.
"""
import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F
from pyspark.sql import types as T

from ..core.isax import inverse_gray, pack_symbols, symbols
from ..core.paa import paa


def equally_split(
    df: DataFrame, n_chunks: int, *, shuffle: bool = False, seed: int = 0
) -> DataFrame:
    """Contiguous equal chunks in id (storage) order; ``shuffle=True``
    applies the paper's random-shuffling variant first."""
    if shuffle:
        key = F.xxhash64(F.col("id"), F.lit(seed))
        return df.withColumn("chunk_id", F.pmod(key, F.lit(n_chunks)).cast("long"))
    w = Window.orderBy("id")
    return df.withColumn("chunk_id", (F.ntile(n_chunks).over(w) - 1).cast("long"))


def buffer_words_np(
    data: np.ndarray, *, w: int = 8, max_bits: int = 8, buffer_bits: int = 2
) -> np.ndarray:
    """Summarization-buffer word per series: top ``buffer_bits`` bits of
    each segment's symbol, packed into one integer."""
    syms = symbols(paa(np.asarray(data, dtype=np.float64), w), max_bits)
    return pack_symbols(syms >> (max_bits - buffer_bits), buffer_bits)


def _with_buffer_col(
    df: DataFrame, *, w: int, max_bits: int, buffer_bits: int
) -> DataFrame:
    @F.pandas_udf(T.LongType())
    def _buffer(series: pd.Series) -> pd.Series:
        data = np.stack(series.to_numpy())
        return pd.Series(buffer_words_np(data, w=w, max_bits=max_bits, buffer_bits=buffer_bits))

    return df.withColumn("buffer", _buffer("series"))


def plan_buffer_assignment(
    counts: pd.DataFrame, n_chunks: int, *, lam: int = 8, tol: float = 0.05
) -> pd.DataFrame:
    """Driver-side DENSITY-AWARE plan over the (small) buffer histogram.

    ``counts`` has columns ``buffer``/``count``. Returns one row per buffer
    with ``chunk_id`` (-1 means "stripe this buffer across all chunks").
    Pure pandas so tests can exercise the balancing logic directly."""
    counts = counts.copy()
    counts["rank"] = inverse_gray(counts["buffer"].to_numpy())
    counts = counts.sort_values("rank").reset_index(drop=True)
    striped = set(
        counts.nlargest(min(lam, len(counts)), "count")["buffer"].tolist()
    )
    loads = np.zeros(n_chunks)
    assign: dict[int, int] = {}
    rr = 0
    for _, row in counts.iterrows():
        b, c = int(row["buffer"]), int(row["count"])
        if b in striped:
            loads += c / n_chunks
            continue
        assign[b] = rr % n_chunks
        loads[rr % n_chunks] += c
        rr += 1
    # rebalance: stripe the largest buffer of the most loaded chunk
    by_chunk = {b: ch for b, ch in assign.items()}
    cnt = dict(zip(counts["buffer"].astype(int), counts["count"].astype(int)))
    for _ in range(len(counts)):
        mean = loads.mean()
        if mean <= 0 or loads.max() <= (1 + tol) * mean:
            break
        worst = int(np.argmax(loads))
        cands = [b for b, ch in by_chunk.items() if ch == worst]
        if not cands:
            break
        victim = max(cands, key=lambda b: cnt[b])
        striped.add(victim)
        del by_chunk[victim]
        del assign[victim]
        loads[worst] -= cnt[victim]
        loads += cnt[victim] / n_chunks
    out = counts[["buffer", "count"]].copy()
    out["chunk_id"] = [assign.get(int(b), -1) for b in out["buffer"]]
    return out


def density_aware(
    df: DataFrame,
    n_chunks: int,
    *,
    w: int = 8,
    max_bits: int = 8,
    buffer_bits: int = 2,
    lam: int = 8,
    tol: float = 0.05,
) -> DataFrame:
    """DENSITY-AWARE partitioning (paper §3.4.1, Gray-code buffer order).

    λ defaults to 8 at mini scale (the paper uses 400 at 100M series and
    reports stability across a wide λ range)."""
    df = _with_buffer_col(df, w=w, max_bits=max_bits, buffer_bits=buffer_bits)
    counts = df.groupBy("buffer").count().toPandas()
    plan = plan_buffer_assignment(counts, n_chunks, lam=lam, tol=tol)
    spark = df.sparkSession
    plan_df = spark.createDataFrame(plan[["buffer", "chunk_id"]].rename(columns={"chunk_id": "planned"}))
    joined = df.join(plan_df, on="buffer", how="left")
    # striped buffers (planned = -1): exact round-robin inside the buffer
    win = Window.partitionBy("buffer").orderBy("id")
    rr = F.pmod(F.row_number().over(win) - 1, F.lit(n_chunks)).cast("long")
    out = joined.withColumn(
        "chunk_id", F.when(F.col("planned") >= 0, F.col("planned").cast("long")).otherwise(rr)
    )
    return out.drop("buffer", "planned")
