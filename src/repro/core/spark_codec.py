"""Spark layer: LCP as a per-partition codec over particle DataFrames.

The paper's storage workflow (§5, Fig. 2) — simulation frames →
batch compression → storage system — maps to Spark as:

* particles live in a DataFrame ``(frame, idx, x, y, z)``;
* compression is ``groupBy(batch_id).applyInPandas``: each task runs
  the batch-local Algorithm 1 (``core.lcp.compress_single_batch``) on
  its batch; the previous batch's *first frame* rows are unioned into
  the group (role tag) so the task can derive its incoming anchor
  without any cross-batch sequencing — batches compress in parallel;
* the compressed container is a Parquet table of binary payloads with
  Parquet's own compression disabled (the bytes are ours);
* partial retrieval (§2.1.3) reads one ``batch`` via Parquet filter
  pushdown plus at most two anchor rows, and decompresses only that —
  never the whole dataset.

Anchor payloads referenced by two batches are emitted by both tasks
(byte-identical, the codec is deterministic) and deduplicated before
writing.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from . import lcp, lcp_s, lcp_t, optimize

ROLE_DATA = 0  # rows belonging to the batch being compressed
ROLE_PREV_FIRST = 1  # raw first frame of the previous batch

COMPRESSED_SCHEMA = (
    "batch long, kind string, frame long, method string, ref string, "
    "payload binary, n_particles long, nbytes long"
)


def frames_to_df(spark: SparkSession, frames: np.ndarray) -> DataFrame:
    """(F, N, 3) array → DataFrame(frame, idx, x, y, z)."""
    frames = np.asarray(frames, dtype=np.float64)
    f, n, _ = frames.shape
    pdf = pd.DataFrame(
        {
            "frame": np.repeat(np.arange(f), n),
            "idx": np.tile(np.arange(n), f),
            "x": frames[:, :, 0].ravel(),
            "y": frames[:, :, 1].ravel(),
            "z": frames[:, :, 2].ravel(),
        }
    )
    return spark.createDataFrame(pdf)


def _group_to_frames(pdf: pd.DataFrame) -> dict[int, np.ndarray]:
    out: dict[int, np.ndarray] = {}
    for frame, g in pdf.groupby("frame"):
        g = g.sort_values("idx")
        out[int(frame)] = g[["x", "y", "z"]].to_numpy(dtype=np.float64)
    return out


def _make_batch_worker(eb: float, p: int, batch_size: int, eb_scale: float,
                       use_temporal: bool):
    def worker(key: tuple, pdf: pd.DataFrame) -> pd.DataFrame:
        batch = int(key[0])
        data = _group_to_frames(pdf[pdf["role"] == ROLE_DATA])
        prev_rows = pdf[pdf["role"] == ROLE_PREV_FIRST]
        prev_first = None
        if len(prev_rows):
            prev_first = _group_to_frames(prev_rows)[
                int(prev_rows["frame"].iloc[0])
            ]
        frames = [data[f] for f in sorted(data)]
        res = lcp.compress_single_batch(
            frames, batch, prev_first, eb, p, batch_size,
            eb_scale=eb_scale, use_temporal=use_temporal,
        )
        rows = []
        for cf in res.frames:
            rows.append(
                dict(batch=batch, kind="frame", frame=cf.frame,
                     method=cf.method, ref=cf.ref or "",
                     payload=cf.payload, n_particles=len(frames[0]),
                     nbytes=len(cf.payload))
            )
        if res.own_anchor_payload is not None:
            rows.append(
                dict(batch=batch, kind="anchor", frame=batch * batch_size,
                     method="spatial", ref="",
                     payload=res.own_anchor_payload,
                     n_particles=len(frames[0]),
                     nbytes=len(res.own_anchor_payload))
            )
        if res.used_prev_anchor:
            rows.append(
                dict(batch=batch - 1, kind="anchor",
                     frame=(batch - 1) * batch_size, method="spatial",
                     ref="", payload=res.prev_anchor_payload,
                     n_particles=len(frames[0]),
                     nbytes=len(res.prev_anchor_payload))
            )
        return pd.DataFrame(rows)

    return worker


def compress_df(
    spark: SparkSession,
    df: DataFrame,
    eb: float,
    batch_size: int = 16,
    p: int | None = None,
    eb_scale: float | None = None,
    use_temporal: bool = True,
) -> DataFrame:
    """Compress a particle DataFrame into a compressed-row DataFrame.

    Dynamic optimizations (§7.4) probe the first two frames on the
    driver (a bounded sample, as in the paper's sampled search).
    """
    if p is None or eb_scale is None:
        probe = df.filter(F.col("frame") <= 1).toPandas()
        probe_frames = _group_to_frames(probe.assign(role=ROLE_DATA))
        sample = [probe_frames[k] for k in sorted(probe_frames)]
        if p is None:
            p = optimize.best_block_size(sample[0], eb)
        if eb_scale is None:
            n_frames = df.agg(F.max("frame")).collect()[0][0] + 1
            n_batches = (n_frames + batch_size - 1) // batch_size
            eb_scale = (
                optimize.choose_eb_scale(
                    sample, eb, n_batches=n_batches, p=p
                )
                if use_temporal
                else 1.0
            )
    data = df.withColumn(
        "batch", (F.col("frame") / F.lit(batch_size)).cast("long")
    ).withColumn("role", F.lit(ROLE_DATA))
    # Previous batch's first frame rows, retagged into the next batch's
    # group so each task can derive its incoming anchor.
    prev_first = (
        df.filter((F.col("frame") % batch_size) == 0)
        .withColumn(
            "batch", (F.col("frame") / F.lit(batch_size)).cast("long") + 1
        )
        .withColumn("role", F.lit(ROLE_PREV_FIRST))
    )
    n_batches = data.agg(F.max("batch")).collect()[0][0] + 1
    prev_first = prev_first.filter(F.col("batch") < n_batches)
    worker = _make_batch_worker(eb, p, batch_size, eb_scale, use_temporal)
    grouped = (
        data.unionByName(prev_first)
        .groupBy("batch")
        .applyInPandas(worker, schema=COMPRESSED_SCHEMA)
    )
    # An anchor referenced by batch b+1 and owned by batch b is emitted
    # twice with identical bytes; keep one.
    return grouped.dropDuplicates(["kind", "frame"])


def write_archive(comp_df: DataFrame, path: str) -> None:
    """Persist compressed rows; Parquet outer compression off so stored
    bytes are the codec's own."""
    (
        comp_df.repartition("batch")
        .write.mode("overwrite")
        .option("compression", "none")
        .parquet(path)
    )


def archive_size_bytes(spark: SparkSession, path: str) -> int:
    """Logical archive size: payload bytes + per-row bookkeeping."""
    df = spark.read.parquet(path)
    row = df.agg(
        F.sum(F.length("payload")).alias("s"), F.count("*").alias("c")
    ).collect()[0]
    return int(row["s"]) + lcp.FRAME_OVERHEAD * int(row["c"])


def read_batch(
    spark: SparkSession, path: str, batch: int, batch_size: int
) -> DataFrame:
    """Partial retrieval (§2.1.3): decompress exactly one batch.

    Reads the batch's frame rows plus the (<= 2) anchor rows it can
    reference, via Parquet predicate pushdown; decompression runs in
    one ``applyInPandas`` task per batch.
    """
    rows = spark.read.parquet(path).filter(
        ((F.col("kind") == "frame") & (F.col("batch") == batch))
        | (
            (F.col("kind") == "anchor")
            & F.col("batch").isin([batch - 1, batch])
        )
    )

    def worker(key: tuple, pdf: pd.DataFrame) -> pd.DataFrame:
        b = int(key[0])
        frame_rows = [
            lcp.CompressedFrame(
                int(r.frame), b, r.method, r.ref or None, bytes(r.payload)
            )
            for r in pdf[pdf["kind"] == "frame"].itertuples()
        ]
        own = pdf[(pdf["kind"] == "anchor") & (pdf["batch"] == b)]
        prev = pdf[(pdf["kind"] == "anchor") & (pdf["batch"] == b - 1)]
        own_payload = bytes(own["payload"].iloc[0]) if len(own) else None
        prev_payload = bytes(prev["payload"].iloc[0]) if len(prev) else None
        dec = lcp.decompress_single_batch(
            frame_rows, own_payload, prev_payload, b, batch_size
        )
        parts = []
        for f_idx, coords in dec.items():
            parts.append(
                pd.DataFrame(
                    {
                        "frame": np.full(len(coords), f_idx, dtype=np.int64),
                        "pos": np.arange(len(coords)),
                        "x": coords[:, 0],
                        "y": coords[:, 1],
                        "z": coords[:, 2],
                    }
                )
            )
        return pd.concat(parts, ignore_index=True)

    return (
        rows.withColumn("grp", F.lit(batch))
        .groupBy("grp")
        .applyInPandas(worker, schema="frame long, pos long, x double, y double, z double")
    )


def decompress_all_df(
    spark: SparkSession, path: str, batch_size: int
) -> DataFrame:
    """Decompress the full archive, one Spark task per batch."""
    comp = spark.read.parquet(path)
    batches = [
        int(r.batch)
        for r in comp.filter(F.col("kind") == "frame")
        .select("batch").distinct().collect()
    ]
    anchors_only = [
        int(r.batch)
        for r in comp.filter(F.col("kind") == "anchor")
        .select("batch").distinct().collect()
    ]
    out = None
    for b in sorted(set(batches) | set(anchors_only)):
        part = read_batch(spark, path, b, batch_size)
        out = part if out is None else out.unionByName(part)
    return out
