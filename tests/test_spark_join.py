"""Spark-layer tests: the range-partitioned parallel join and the
micro-batch driver, validated through ``oracle.assert_equivalent`` (the
DuckDB band-join-over-count-window SQL runs over the same stream table
the Spark job consumed)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.join import ibwj
from repro.join.spark_join import (
    key_bounds,
    microbatch_band_join,
    parallel_band_join,
    stream_to_df,
)
from repro.join.streams import band_join_sql, diff_for_match_rate, gen_stream
from repro.oracle import assert_equivalent


def _assert_join(spark, seq, result_df, w_r, w_s, diff, self_join=False):
    sql = band_join_sql(w_r, w_s, diff, self_join=self_join)
    assert_equivalent(result_df, sql, stream=seq)


@pytest.mark.parametrize("n_partitions", [1, 4, 8])
def test_parallel_join_matches_oracle(spark, n_partitions):
    w = 256
    seq = gen_stream(4000, seed=30)
    diff = diff_for_match_rate(2.0, w)
    out = parallel_band_join(
        spark, seq, w, w, diff, n_partitions=n_partitions
    )
    _assert_join(spark, seq, out, w, w, diff)


def test_parallel_join_self_join(spark):
    w = 200
    seq = gen_stream(3000, seed=31, self_join=True)
    diff = diff_for_match_rate(2.0, w)
    out = parallel_band_join(
        spark, seq, w, w, diff, n_partitions=8, self_join=True
    )
    _assert_join(spark, seq, out, w, w, diff, self_join=True)


def test_parallel_join_asymmetric_windows(spark):
    seq = gen_stream(3000, seed=32)
    diff = diff_for_match_rate(2.0, 512)
    out = parallel_band_join(spark, seq, 64, 512, diff, n_partitions=4)
    _assert_join(spark, seq, out, 64, 512, diff)


def test_parallel_join_asymmetric_rates(spark):
    w = 192
    seq = gen_stream(3000, seed=33, rate_r=3, rate_s=1)
    diff = diff_for_match_rate(2.0, w)
    out = parallel_band_join(spark, seq, w, w, diff, n_partitions=4)
    _assert_join(spark, seq, out, w, w, diff)


@pytest.mark.parametrize("dist", ["gaussian", "gamma_k1"])
def test_parallel_join_skewed_keys(spark, dist):
    """approxQuantile bounds adapt to skew, so skewed keys still pass."""
    w = 192
    seq = gen_stream(3000, seed=34, dist=dist)
    diff = diff_for_match_rate(2.0, w)
    out = parallel_band_join(spark, seq, w, w, diff, n_partitions=8)
    _assert_join(spark, seq, out, w, w, diff)


def test_parallel_join_wide_band_crosses_partitions(spark):
    """A band wider than a partition must replicate probes to several
    buckets and still produce each pair exactly once."""
    w = 128
    seq = gen_stream(1500, seed=35, key_space=1000)
    diff = 300  # covers several of the 8 buckets
    out = parallel_band_join(spark, seq, w, w, diff, n_partitions=8)
    _assert_join(spark, seq, out, w, w, diff)


@pytest.mark.parametrize("batch_size", [500, 1000, 4000])
def test_microbatch_join_matches_oracle(spark, batch_size):
    w = 192
    seq = gen_stream(3000, seed=36)
    diff = diff_for_match_rate(2.0, w)
    out = microbatch_band_join(
        spark, seq, w, w, diff, n_partitions=4, batch_size=batch_size
    )
    _assert_join(
        spark, seq, spark.createDataFrame(out), w, w, diff
    )


def test_microbatch_self_join(spark):
    w = 128
    seq = gen_stream(2000, seed=37, self_join=True)
    diff = diff_for_match_rate(2.0, w)
    out = microbatch_band_join(
        spark, seq, w, w, diff,
        n_partitions=4, batch_size=700, self_join=True,
    )
    _assert_join(
        spark, seq, spark.createDataFrame(out), w, w, diff, self_join=True
    )


def test_microbatch_equals_oneshot(spark):
    w = 160
    seq = gen_stream(2500, seed=38)
    diff = diff_for_match_rate(2.0, w)
    one = parallel_band_join(spark, seq, w, w, diff, n_partitions=4).toPandas()
    mb = microbatch_band_join(
        spark, seq, w, w, diff, n_partitions=4, batch_size=600
    )
    key = ["later_gpos", "earlier_gpos"]
    a = one.sort_values(key).reset_index(drop=True)
    b = mb.sort_values(key).reset_index(drop=True)
    pd.testing.assert_frame_equal(a, b)


def test_spark_matches_single_threaded_driver(spark):
    """Cross-implementation agreement: Spark partition-parallel result ==
    single-threaded PIM IBWJ result."""
    w = 192
    seq = gen_stream(2500, seed=39)
    diff = diff_for_match_rate(2.0, w)
    st = ibwj.run_ibwj(
        seq, w, w, diff, lambda win: ibwj.PIMAdapter(win, 0.5, 2)
    )
    got = parallel_band_join(spark, seq, w, w, diff, n_partitions=8).toPandas()
    assert set(zip(got.later_gpos, got.earlier_gpos)) == set(st.pairs)


def test_key_bounds_adapt_to_distribution(spark):
    """Range boundaries follow the data distribution (the PIM-Tree
    partition-adaptation analogue): skewed keys get denser boundaries
    near the mode."""
    seq = gen_stream(20000, seed=40, dist="gamma_k1")
    df = stream_to_df(spark, seq)
    bounds = key_bounds(df, 8)
    assert len(bounds) == 7
    assert bounds == sorted(bounds)
    # gamma(k=1) mass sits low: the median boundary is far below mid-domain
    from repro.join.streams import KEY_SPACE

    assert bounds[3] < KEY_SPACE // 2


def test_key_bounds_single_partition(spark):
    seq = gen_stream(100, seed=41)
    df = stream_to_df(spark, seq)
    assert key_bounds(df, 1) == []


def test_partition_ownership_is_unique(spark):
    """Every tuple has exactly one owner row after replication."""
    from repro.join.spark_join import _assign_partitions

    seq = gen_stream(2000, seed=42)
    df = stream_to_df(spark, seq)
    bounds = key_bounds(df, 8)
    rows = _assign_partitions(df, bounds, diff=5000)
    owners = (
        rows.filter(F.col("is_owner"))
        .groupBy("gpos")
        .count()
        .agg(F.max("count"), F.min("count"), F.count("*"))
        .collect()[0]
    )
    assert owners[0] == 1 and owners[1] == 1 and owners[2] == 2000
