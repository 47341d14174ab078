"""E11: DTW with 5% warping vs nodes × replication (paper Fig 19)."""
from repro.experiments.harness import dtw_experiment


def test_bench_dtw(spark, run_table):
    df = run_table(
        "e11_dtw",
        dtw_experiment,
        spark,
        warp=0.05,
        n_nodes_list=(2, 4, 8),
        n_queries=20,
        n_series=1500,
    )
    assert (df["warp"] == 0.05).all()
