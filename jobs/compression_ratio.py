"""Reproduce paper Fig. 11: multi-frame compression ratios per dataset,
error bound, and batch size — with LCP running through the *Spark*
codec path (parallel batch compression → Parquet archive → partial
retrieval), baselines through the shared numpy harness.

Usage: spark-submit jobs/compression_ratio.py [out_dir]
"""
import sys
import tempfile
import time

import _session
from pyspark.sql import functions as F

from repro.analysis import experiments as E
from repro.baselines import registry
from repro.core import spark_codec
from repro.datasets import particles

N, FRAMES = 20_000, 16


def lcp_spark_cr(spark, data, eb, bs, out_dir):
    path = f"{out_dir}/lcp_eb{eb}_bs{bs}.parquet"
    df = spark_codec.frames_to_df(spark, data)
    t0 = time.perf_counter()
    comp = spark_codec.compress_df(spark, df, eb=eb, batch_size=bs)
    spark_codec.write_archive(comp, path)
    t1 = time.perf_counter()
    size = spark_codec.archive_size_bytes(spark, path)
    # Batch-granular partial retrieval timing (the §2.1.3 workflow).
    t2 = time.perf_counter()
    n_rows = spark_codec.read_batch(spark, path, 0, bs).count()
    t3 = time.perf_counter()
    assert n_rows > 0
    return data.nbytes / size, t1 - t0, t3 - t2


if __name__ == "__main__":
    out_dir = sys.argv[1] if len(sys.argv) > 1 else tempfile.mkdtemp()
    spark = _session.get_spark("fig11-compression-ratio")
    rows = []
    baselines = [c for c in registry.all_codecs() if c.name != "lcp"]
    for name in particles.MULTIFRAME:
        data = particles.load(name, N, FRAMES)
        for eb in (1e-2, 1e-3):
            for bs in (8, 16):
                row = {"dataset": name, "eb": eb, "batch": bs}
                cr, t_comp, t_ret = lcp_spark_cr(spark, data, eb, bs, out_dir)
                row["cr_lcp"] = cr
                row["lcp_spark_comp_s"] = t_comp
                row["lcp_batch_retrieval_s"] = t_ret
                for codec in baselines:
                    arch = codec.compress_frames(list(data), eb, bs)
                    row[f"cr_{codec.name}"] = data.nbytes / arch.size_bytes()
                rows.append(row)
    print(E.format_rows(rows, "Fig. 11 — multi-frame compression ratios"))
    spark.stop()
