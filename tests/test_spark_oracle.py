"""Spark SQL twins of the LCP math, checked against DuckDB via the
oracle — a wrong Catalyst expression (not just a crashing one) fails
these."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core import blocks, quantize
from repro.datasets import particles
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def cloud_pdf():
    coords = particles.load("lj", 3000, 1)[0]
    return pd.DataFrame(
        {"idx": np.arange(len(coords)), "x": coords[:, 0],
         "y": coords[:, 1], "z": coords[:, 2]}
    )


def test_quantize_expr_matches_duckdb(spark, cloud_pdf):
    eb = 1e-2
    mins = {c: float(cloud_pdf[c].min()) for c in "xyz"}
    df = spark.createDataFrame(cloud_pdf)
    out = df.select(
        "idx",
        *[
            quantize.quantize_expr(F.col(c), eb, mins[c]).alias(f"q{c}")
            for c in "xyz"
        ],
    )
    sql = f"""
        SELECT idx,
               CAST(floor((x - {mins['x']!r}) / {2 * eb!r}) AS BIGINT) AS qx,
               CAST(floor((y - {mins['y']!r}) / {2 * eb!r}) AS BIGINT) AS qy,
               CAST(floor((z - {mins['z']!r}) / {2 * eb!r}) AS BIGINT) AS qz
        FROM cloud
    """
    assert_equivalent(out, sql, cloud=cloud_pdf)


def test_dequantize_expr_matches_duckdb(spark, cloud_pdf):
    eb = 1e-2
    minx = float(cloud_pdf["x"].min())
    df = spark.createDataFrame(cloud_pdf)
    q = quantize.quantize_expr(F.col("x"), eb, minx)
    out = df.select(
        "idx", quantize.dequantize_expr(q, eb, minx).alias("x_recon")
    )
    sql = f"""
        SELECT idx,
               (2.0 * CAST(floor((x - {minx!r}) / {2 * eb!r}) AS BIGINT) + 1.0)
                 * {eb!r} + {minx!r} AS x_recon
        FROM cloud
    """
    assert_equivalent(out, sql, cloud=cloud_pdf)


def test_block_id_expr_matches_duckdb_and_numpy(spark, cloud_pdf):
    eb, p = 1e-2, 16
    coords = cloud_pdf[["x", "y", "z"]].to_numpy()
    q, mins = quantize.quantize(coords, eb)
    asg = blocks.assign(q, p)
    bn = asg.bn.tolist()
    df = spark.createDataFrame(cloud_pdf)
    qcols = [
        quantize.quantize_expr(F.col(c), eb, float(mins[i]))
        for i, c in enumerate("xyz")
    ]
    out = df.select(
        "idx", blocks.block_id_expr(qcols, p, bn).alias("block_id")
    )
    # DuckDB twin of Eq. 6.
    terms = []
    stride = 1
    for i, c in enumerate("xyz"):
        q_expr = (
            f"CAST(floor((({c} - {float(mins[i])!r}) / {2 * eb!r})) AS BIGINT)"
        )
        terms.append(f"CAST(floor({q_expr} / {p}) AS BIGINT) * {stride}")
        stride *= bn[i] if i < 2 else 1
    sql = f"SELECT idx, {' + '.join(terms)} AS block_id FROM cloud"
    assert_equivalent(out, sql, cloud=cloud_pdf)
    # And against the numpy kernel.
    got = {r["idx"]: r["block_id"] for r in out.collect()}
    linear = blocks.linear_block_id(q // p, asg.bn)
    for i in range(len(coords)):
        assert got[i] == linear[i]


def test_nonempty_block_counts_match_duckdb(spark, cloud_pdf):
    """§6.2.1: per-block particle counts — Spark aggregation vs DuckDB."""
    eb, p = 1e-2, 16
    coords = cloud_pdf[["x", "y", "z"]].to_numpy()
    q, mins = quantize.quantize(coords, eb)
    bn = blocks.assign(q, p).bn.tolist()
    df = spark.createDataFrame(cloud_pdf)
    qcols = [
        quantize.quantize_expr(F.col(c), eb, float(mins[i]))
        for i, c in enumerate("xyz")
    ]
    out = (
        df.select(blocks.block_id_expr(qcols, p, bn).alias("block_id"))
        .groupBy("block_id")
        .agg(F.count("*").alias("n"))
    )
    stride = 1
    terms = []
    for i, c in enumerate("xyz"):
        q_expr = (
            f"CAST(floor((({c} - {float(mins[i])!r}) / {2 * eb!r})) AS BIGINT)"
        )
        terms.append(f"CAST(floor({q_expr} / {p}) AS BIGINT) * {stride}")
        stride *= bn[i] if i < 2 else 1
    sql = (
        f"SELECT {' + '.join(terms)} AS block_id, COUNT(*) AS n "
        "FROM cloud GROUP BY 1"
    )
    assert_equivalent(out, sql, cloud=cloud_pdf)
    # Counts must also match the codec's own stream.
    asg = blocks.assign(q, p)
    got = {r["block_id"]: r["n"] for r in out.collect()}
    assert got == dict(zip(asg.block_ids.tolist(), asg.counts.tolist()))
