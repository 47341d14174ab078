"""Distributed engine tests: DuckDB-oracle result equality + work stats."""
import json

import numpy as np
import pytest

from repro.distributed.engine import build_only, chunk_search, distributed_search
from repro.distributed.partitioning import density_aware, equally_split
from repro.oracle import assert_equivalent
from repro.synth_data import (
    clustered_walks_np,
    make_queries_np,
    series_df,
    series_long_pdf,
)

from .oracle_sql import NN_SQL, knn_sql

N, L, NQ = 320, 32, 6


@pytest.fixture(scope="module")
def setup(spark):
    data = clustered_walks_np(N, L, seed=23)
    queries, _ = make_queries_np(data, NQ, seed=29)
    df = series_df(spark, data)
    series_long = series_long_pdf(data)
    queries_long = series_long_pdf(queries, id_col="qid")
    return data, queries, df, series_long, queries_long


@pytest.mark.parametrize("n_chunks", [1, 3, 4])
@pytest.mark.parametrize("share_bsf", [True, False])
def test_distributed_1nn_matches_oracle(spark, setup, n_chunks, share_bsf):
    """Index-pruned NN search across partitions == DuckDB brute force."""
    data, queries, df, series_long, queries_long = setup
    res = distributed_search(
        equally_split(df, n_chunks), queries, share_bsf=share_bsf
    )
    assert_equivalent(
        spark.createDataFrame(res.answers),
        NN_SQL,
        series=series_long,
        queries=queries_long,
    )


@pytest.mark.parametrize("algorithm", ["odyssey", "messi"])
def test_algorithms_match_oracle(spark, setup, algorithm):
    data, queries, df, series_long, queries_long = setup
    res = distributed_search(equally_split(df, 4), queries, algorithm=algorithm)
    assert_equivalent(
        spark.createDataFrame(res.answers),
        NN_SQL,
        series=series_long,
        queries=queries_long,
    )


def test_density_aware_partitioning_matches_oracle(spark, setup):
    data, queries, df, series_long, queries_long = setup
    res = distributed_search(density_aware(df, 4), queries)
    assert_equivalent(
        spark.createDataFrame(res.answers),
        NN_SQL,
        series=series_long,
        queries=queries_long,
    )


@pytest.mark.parametrize("k", [3, 5])
def test_distributed_knn_matches_oracle(spark, setup, k):
    data, queries, df, series_long, queries_long = setup
    res = distributed_search(equally_split(df, 4), queries, k=k)
    assert_equivalent(
        spark.createDataFrame(res.answers),
        knn_sql(k),
        series=series_long,
        queries=queries_long,
    )


def test_distributed_dtw_matches_reference(setup):
    """DTW is not expressible in portable SQL — check against the
    independent brute-force DP reference instead."""
    from repro.core.dtw import brute_force_dtw_nn

    data, queries, df, *_ = setup
    res = distributed_search(equally_split(df, 3), queries[:3], distance="dtw", warp=0.1)
    ids = np.arange(len(data))
    for _, r in res.answers.iterrows():
        ref_d, ref_id = brute_force_dtw_nn(data, ids, queries[int(r.query_id)], warp=0.1)[0]
        assert r.nn_dist == pytest.approx(ref_d, abs=1e-9)


def test_chunk_stats_shape_and_fields(setup):
    data, queries, df, *_ = setup
    res = distributed_search(equally_split(df, 4), queries)
    st = res.chunk_stats
    assert len(st) == 4 * NQ
    assert (st["n_series"].groupby(st["chunk_id"]).first().sum()) == N
    assert (st["total_cost"] > 0).all()
    assert (st["real_series"] >= 0).all()
    for pq in st["pq_costs"]:
        assert isinstance(json.loads(pq), list)


def test_bsf_sharing_reduces_work(setup):
    """The headline mechanism: chunks without the NN prune with the shared
    global BSF, so total real-distance work drops vs local-only BSFs."""
    data, queries, df, *_ = setup
    shared = distributed_search(equally_split(df, 4), queries, share_bsf=True)
    local = distributed_search(equally_split(df, 4), queries, share_bsf=False)
    assert (
        shared.chunk_stats["real_series"].sum()
        < local.chunk_stats["real_series"].sum()
    )


def test_odyssey_work_not_worse_than_messi_distributed(setup):
    data, queries, df, *_ = setup
    ody = distributed_search(equally_split(df, 4), queries, algorithm="odyssey")
    mes = distributed_search(equally_split(df, 4), queries, algorithm="messi")
    assert (
        ody.chunk_stats["real_series"].sum() <= mes.chunk_stats["real_series"].sum()
    )


def test_approx_pass_cost_folded_into_serial(setup):
    data, queries, df, *_ = setup
    shared = distributed_search(equally_split(df, 2), queries, share_bsf=True)
    local = distributed_search(equally_split(df, 2), queries, share_bsf=False)
    # sharing adds the approximate pass to the non-stealable serial part
    assert shared.chunk_stats["t_serial"].sum() > local.chunk_stats["t_serial"].sum()


def test_build_only_per_chunk(setup):
    data, _, df, *_ = setup
    stats = build_only(equally_split(df, 4))
    assert list(stats["chunk_id"]) == [0, 1, 2, 3]
    assert stats["n_series"].sum() == N
    assert (stats["index_bytes"] > 0).all()
    assert (stats["buffer_cost"] == stats["n_series"] * L).all()


def test_chunk_search_single_pass(setup):
    data, queries, df, *_ = setup
    stats = chunk_search(equally_split(df, 2), queries[:2], approx_only=True)
    assert len(stats) == 4  # 2 chunks × 2 queries
    assert (stats["approx_bsf"] == stats["nn_dist"]).all()


def test_invalid_algorithm_rejected(setup):
    data, queries, df, *_ = setup
    with pytest.raises(ValueError):
        distributed_search(equally_split(df, 2), queries[:1], algorithm="nope")
