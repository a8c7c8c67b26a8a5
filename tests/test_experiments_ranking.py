"""Harness-level tests: every table/figure experiment runs at small
scale, produces sane rows, and the headline shapes of the paper hold
(LCP first in CR, temporal gains where expected, error bound kept)."""
import numpy as np
import pytest

from repro.analysis import experiments as E
from repro.analysis import ranking as R


class TestRankingMath:
    def test_simple_ranks(self):
        out = R.rank_table({"a": [10, 10], "b": [5, 6], "c": [1, 2]})
        assert out == {"a": 1.0, "b": 2.0, "c": 3.0}

    def test_tie_averaging(self):
        out = R.rank_table({"a": [10], "b": [10], "c": [1]})
        assert out["a"] == out["b"] == 1.5
        assert out["c"] == 3.0

    def test_rank_flips_with_metric(self):
        out = R.rank_table({"a": [1, 9], "b": [9, 1]})
        assert out["a"] == out["b"] == 1.5

    def test_nemenyi_cd_decreases_with_cases(self):
        assert R.nemenyi_cd(8, 100) < R.nemenyi_cd(8, 10)

    def test_nemenyi_known_value(self):
        # k=2, n=6: CD = 1.96 * sqrt(2*3/(6*6)) = 1.96/sqrt(6)
        assert np.isclose(R.nemenyi_cd(2, 6), 1.96 / np.sqrt(6))


class TestHarnesses:
    def test_table2_rows(self):
        rows = E.table2_blocking(n=2000)
        assert len(rows) == 3
        for r in rows:
            # Paper Table 2's shape: blocking lowers entropy and raises
            # autocorrelation, monotonically with smaller blocks.
            assert r["entropy_bs64"] < r["entropy_noblock"]
            assert r["entropy_bs8"] < r["entropy_bs64"]
            assert r["acorr_bs64"] > 0.99
            assert r["entropy_bs8"] <= 3.001

    def test_table3_rows(self):
        rows = E.table3_coding(n=2000, ebs=[1e-2])
        assert len(rows) == 3
        for r in rows:
            assert r["id_winner"] in ("huffman", "fixed")
            assert r["rel_huffman_B"] > 0 and r["rel_fixed_B"] > 0

    def test_ablation_shape(self):
        rows = E.ablation(
            datasets=["helium"], n=1200, frames=8, ebs=(1e-2,), batch_size=4
        )
        r = rows[0]
        # Fig. 8 ordering: +BLK >= LCP-S, +LCP-T >= +BLK on temporal data.
        assert r["cr_lcp_s_blk"] >= r["cr_lcp_s"] * 0.95
        assert r["cr_lcp_s_blk_t"] > r["cr_lcp_s_blk"]
        assert r["cr_lcp_full"] >= r["cr_lcp_s_blk_t"] * 0.9

    def test_error_distribution_within_bound(self):
        rows = E.error_distribution(n=1500, frames=4)
        assert rows[0]["within_bound"]
        assert rows[0]["max_err"] <= 0.1 * (1 + 1e-9)

    def test_compression_ratio_lcp_wins(self):
        rows = E.compression_ratio(
            datasets=["helium", "yiip"], n=1500, frames=8,
            ebs=(1e-2,), batch_sizes=(4,),
        )
        for r in rows:
            others = [v for k, v in r.items() if k.startswith("cr_") and k != "cr_lcp"]
            assert r["cr_lcp"] == max([r["cr_lcp"], *others])

    def test_rate_distortion_single(self):
        rows = E.rate_distortion_single(
            datasets=["lj"], n=1000, ebs=[1e-2]
        )
        r = rows[0]
        assert r["br_lcp"] < 64  # compresses at all
        assert r["psnr_lcp"] > 40

    def test_rate_distortion_multi(self):
        rows = E.rate_distortion_multi(
            datasets=["helium"], n=1000, frames=8, ebs=(1e-2,), batch_size=4
        )
        r = rows[0]
        assert r["br_lcp"] < r["br_sz2"]
        assert r["psnr_lcp"] > 40

    def test_speed_rows_positive(self):
        rows = E.speed(datasets=["lj"], n=2000)
        for r in rows:
            assert r["comp_MB_s"] > 0 and r["decomp_MB_s"] > 0

    def test_speed_batch_rows(self):
        rows = E.speed_batch(datasets=["helium"], n=800, frames=8, batch_size=4)
        assert {r["codec"] for r in rows} == {
            "lcp", "sz2", "sz3", "mdz", "zfp", "sperr", "draco", "tmc13"
        }

    def test_ranking_lcp_first(self):
        rows = E.ranking(
            datasets=["helium", "copper"], n=1000, frames=6,
            ebs=(1e-2,), batch_sizes=(3,),
        )
        assert rows[0]["codec"] == "lcp"  # Fig. 10: LCP ranks first
        assert rows[0]["mean_rank"] < rows[-1]["mean_rank"]

    def test_visual_quality_rows(self):
        rows = E.visual_quality(
            datasets=["bunzipper"], n=1500, target_cr=8.0,
        )
        by_codec = {r["codec"]: r for r in rows}
        assert "lcp" in by_codec
        assert by_codec["lcp"]["psnr"] > 30

    def test_format_rows(self):
        txt = E.format_rows([{"a": 1, "b": 2.5}], "T")
        assert "== T ==" in txt and "2.500" in txt

    def test_format_rows_empty(self):
        assert "(no rows)" in E.format_rows([], "X")
