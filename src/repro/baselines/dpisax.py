"""DPiSAX baseline (Yagoubi et al., re-implemented per paper §5).

DPiSAX samples the collection, computes the samples' iSAX words, and
splits the *iSAX word space* into contiguous ranges of equal sample mass
— each node indexes one range. Similar series therefore land on the same
node (the locality the paper's DENSITY-AWARE scheme deliberately avoids).
Query answering (as in the paper's fair comparison) is MESSI per node
with local-only BSFs; the coordinator merges the partial answers.
"""
import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T

from ..core.isax import pack_symbols, symbols
from ..core.paa import paa
from ..distributed.engine import DistResult, distributed_search


def dpisax_words_np(
    data: np.ndarray, *, w: int = 8, max_bits: int = 8, word_bits: int = 3
) -> np.ndarray:
    """Sortable iSAX word (top ``word_bits`` per segment, packed)."""
    syms = symbols(paa(np.asarray(data, dtype=np.float64), w), max_bits)
    return pack_symbols(syms >> (max_bits - word_bits), word_bits)


def dpisax_partition(
    df: DataFrame,
    n_chunks: int,
    *,
    w: int = 8,
    max_bits: int = 8,
    word_bits: int = 3,
    sample_fraction: float = 0.2,
    seed: int = 0,
) -> DataFrame:
    """Assign ``chunk_id`` by sampled iSAX-word range partitioning."""

    @F.pandas_udf(T.LongType())
    def _word(series: pd.Series) -> pd.Series:
        data = np.stack(series.to_numpy())
        return pd.Series(dpisax_words_np(data, w=w, max_bits=max_bits, word_bits=word_bits))

    with_word = df.withColumn("isax_word", _word("series"))
    sample = (
        with_word.select("isax_word")
        .sample(fraction=min(1.0, sample_fraction), seed=seed)
        .toPandas()["isax_word"]
        .to_numpy()
    )
    if len(sample) == 0:
        sample = with_word.select("isax_word").toPandas()["isax_word"].to_numpy()
    sample = np.sort(sample)
    # n_chunks - 1 split points at equal sample mass
    cuts = [
        float(sample[min(len(sample) - 1, int(np.ceil(len(sample) * i / n_chunks)))])
        for i in range(1, n_chunks)
    ]
    chunk = F.lit(0).cast("long")
    for c in cuts:
        chunk = chunk + F.when(F.col("isax_word") >= F.lit(c), F.lit(1)).otherwise(F.lit(0))
    return with_word.withColumn("chunk_id", chunk.cast("long")).drop("isax_word")


def dpisax_search(
    chunked_df: DataFrame, queries: np.ndarray, **kwargs
) -> DistResult:
    """DPiSAX query answering: per-node MESSI, local BSFs, merge at end."""
    return distributed_search(
        chunked_df, queries, share_bsf=False, algorithm="messi", **kwargs
    )
