"""End-to-end tests of the Spark codec layer: parallel batch
compression, Parquet container, batch-granular partial retrieval, and
DuckDB-checked analytics over decompressed data."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core import lcp, spark_codec
from repro.datasets import particles
from repro.oracle import assert_equivalent

EB = 1e-2
BS = 4
N = 800
FRAMES = 8


@pytest.fixture(scope="module")
def data():
    return particles.load("helium", N, FRAMES)


@pytest.fixture(scope="module")
def archive(spark, data, tmp_path_factory):
    path = str(tmp_path_factory.mktemp("arch") / "lcp.parquet")
    df = spark_codec.frames_to_df(spark, data)
    comp = spark_codec.compress_df(
        spark, df, eb=EB, batch_size=BS, p=64, eb_scale=1.0
    )
    spark_codec.write_archive(comp, path)
    return path


def test_frames_to_df_shape(spark, data):
    df = spark_codec.frames_to_df(spark, data)
    assert df.count() == N * FRAMES
    assert set(df.columns) == {"frame", "idx", "x", "y", "z"}


def test_archive_rows_wellformed(spark, archive):
    rows = spark.read.parquet(archive).collect()
    kinds = {r.kind for r in rows}
    assert kinds <= {"frame", "anchor"}
    frames_stored = sorted(
        r.frame for r in rows if r.kind == "frame"
    ) + sorted(r.frame for r in rows if r.kind == "anchor")
    assert sorted(frames_stored) == list(range(FRAMES)) or len(rows) >= FRAMES


def test_spark_matches_core_worker_exactly(spark, data, archive):
    full = (
        spark_codec.decompress_all_df(spark, archive, BS)
        .toPandas()
        .sort_values(["frame", "pos"])
    )
    outs = {}
    prev_first = None
    for b in range(FRAMES // BS):
        res = lcp.compress_single_batch(
            list(data[b * BS : (b + 1) * BS]), b, prev_first, EB, 64, BS,
            eb_scale=1.0,
        )
        dec = lcp.decompress_single_batch(
            res.frames, res.own_anchor_payload, res.prev_anchor_payload,
            b, BS,
        )
        outs.update({f: (dec[f], res.perms[f]) for f in dec})
        prev_first = data[b * BS]
    for f in range(FRAMES):
        got = full[full["frame"] == f][["x", "y", "z"]].to_numpy()
        expect, perm = outs[f]
        assert np.array_equal(got, expect)
        assert np.abs(got - data[f][perm]).max() <= EB * (1 + 1e-9)


def test_partial_retrieval_single_batch(spark, archive, data):
    pr = spark_codec.read_batch(spark, archive, 1, BS).toPandas()
    assert sorted(pr["frame"].unique()) == [4, 5, 6, 7]
    assert len(pr) == 4 * N


def test_partial_retrieval_reads_only_needed_rows(spark, archive):
    # The retrieval plan must touch only the target batch's frame rows
    # plus anchors of batch-1/batch — never other batches' frames.
    comp = spark.read.parquet(archive)
    total_rows = comp.count()
    needed = comp.filter(
        ((F.col("kind") == "frame") & (F.col("batch") == 1))
        | ((F.col("kind") == "anchor") & F.col("batch").isin([0, 1]))
    ).count()
    assert needed < total_rows  # strictly partial
    pr = spark_codec.read_batch(spark, archive, 1, BS)
    assert pr.count() == 4 * N  # and it still fully reconstructs


def test_archive_size_accounting(spark, archive):
    size = spark_codec.archive_size_bytes(spark, archive)
    comp = spark.read.parquet(archive).collect()
    manual = sum(len(bytes(r.payload)) for r in comp) + 13 * len(comp)
    assert size == manual


def test_compression_ratio_positive(spark, archive, data):
    size = spark_codec.archive_size_bytes(spark, archive)
    assert data.nbytes / size > 3


def test_decompressed_analytics_match_duckdb(spark, archive, data):
    """Post-hoc analysis on decompressed data (per-frame centroids)
    cross-checked against DuckDB over the same decompressed rows, and
    within eb of the original centroids."""
    dec = spark_codec.decompress_all_df(spark, archive, BS)
    agg = dec.groupBy("frame").agg(
        F.count("*").alias("n"),
        F.avg("x").alias("cx"),
        F.avg("y").alias("cy"),
    )
    dec_pdf = dec.toPandas()
    assert_equivalent(
        agg,
        "SELECT frame, COUNT(*) AS n, AVG(x) AS cx, AVG(y) AS cy "
        "FROM dec GROUP BY frame",
        dec=dec_pdf,
    )
    for r in agg.collect():
        orig = data[int(r.frame)]
        assert r.n == N
        assert abs(r.cx - orig[:, 0].mean()) <= EB
        assert abs(r.cy - orig[:, 1].mean()) <= EB


def test_range_query_on_decompressed_matches_duckdb(spark, archive):
    dec = spark_codec.decompress_all_df(spark, archive, BS)
    out = (
        dec.filter((F.col("x") > 25.0) & (F.col("x") < 75.0))
        .groupBy("frame")
        .agg(F.count("*").alias("n_in_slab"))
    )
    assert_equivalent(
        out,
        "SELECT frame, COUNT(*) AS n_in_slab FROM dec "
        "WHERE x > 25.0 AND x < 75.0 GROUP BY frame",
        dec=dec.toPandas(),
    )


def test_eb_scale_anchor_precision(spark, data, tmp_path):
    """With eb_scale forced to 5, anchors must decompress ~5x more
    precisely than eb."""
    path = str(tmp_path / "scaled.parquet")
    df = spark_codec.frames_to_df(spark, data)
    comp = spark_codec.compress_df(
        spark, df, eb=EB, batch_size=BS, p=64, eb_scale=5.0
    )
    spark_codec.write_archive(comp, path)
    anchor0 = spark_codec.read_batch(spark, path, 0, BS).toPandas()
    f0 = anchor0[anchor0["frame"] == 0][["x", "y", "z"]].to_numpy()
    res = lcp.compress_single_batch([data[0]], 0, None, EB, 64, BS, eb_scale=5.0)
    perm = res.perms[0]
    assert np.abs(f0 - data[0][perm]).max() <= EB / 5 * (1 + 1e-9)
