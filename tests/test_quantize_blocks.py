"""Unit tests for Eq. 5 quantization and Eq. 6 spatial blocking,
including the Spark SQL expression twins (numpy-diffed here; the
DuckDB oracle checks live in test_spark_oracle.py)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import blocks, quantize


class TestQuantize:
    @pytest.mark.parametrize("eb", [1e-1, 1e-2, 1e-3, 0.5, 3.0])
    def test_error_bound_holds(self, eb):
        g = np.random.default_rng(0)
        coords = g.uniform(-50, 150, (5000, 3))
        q, mins = quantize.quantize(coords, eb)
        recon = quantize.dequantize(q, eb, mins)
        assert np.abs(recon - coords).max() <= eb * (1 + 1e-9)

    def test_nonnegative_bins(self):
        g = np.random.default_rng(1)
        coords = g.normal(0, 10, (1000, 3))
        q, _ = quantize.quantize(coords, 1e-2)
        assert q.min() >= 0

    def test_fixed_mins_reused(self):
        coords = np.array([[1.0, 2.0, 3.0], [4.0, 5.0, 6.0]])
        mins = np.array([0.0, 0.0, 0.0])
        q, m = quantize.quantize(coords, 0.5, mins)
        assert np.array_equal(m, mins)
        assert q.tolist() == [[1, 2, 3], [4, 5, 6]]

    def test_deterministic(self):
        g = np.random.default_rng(2)
        coords = g.uniform(0, 1, (100, 3))
        q1, _ = quantize.quantize(coords, 1e-3)
        q2, _ = quantize.quantize(coords, 1e-3)
        assert np.array_equal(q1, q2)

    @given(
        st.lists(
            st.floats(-1e6, 1e6, allow_nan=False, width=64), min_size=1, max_size=100
        ),
        st.floats(1e-4, 10.0),
    )
    @settings(max_examples=50, deadline=None)
    def test_hypothesis_bound(self, vals, eb):
        coords = np.array(vals).reshape(-1, 1)
        q, mins = quantize.quantize(coords, eb)
        recon = quantize.dequantize(q, eb, mins)
        # Bin-centre reconstruction is exact in real arithmetic; float
        # evaluation may exceed by a few ulps of the coordinate
        # magnitude (e.g. 65536 + 1e-4 rounds up), hence the
        # magnitude-scaled slack.
        slack = max(np.abs(coords).max(), 1.0) * 1e-13
        assert np.abs(recon - coords).max() <= eb * (1 + 1e-9) + slack


class TestLinearBlockId:
    def test_matches_equation6(self):
        # Eq. 6: bid.x + bn.x*bid.y + bn.x*bn.y*bid.z
        bid = np.array([[1, 2, 3]])
        bn = np.array([10, 20, 30])
        assert blocks.linear_block_id(bid, bn)[0] == 1 + 10 * 2 + 10 * 20 * 3

    def test_unravel_inverse(self):
        g = np.random.default_rng(3)
        bn = np.array([7, 11, 5])
        bid = np.column_stack([g.integers(0, b, 500) for b in bn])
        linear = blocks.linear_block_id(bid, bn)
        assert np.array_equal(blocks.unravel_block_id(linear, bn), bid)

    def test_unique_over_grid(self):
        bn = np.array([4, 3, 2])
        grid = np.stack(
            np.meshgrid(*[np.arange(b) for b in bn], indexing="ij"), axis=-1
        ).reshape(-1, 3)
        linear = blocks.linear_block_id(grid, bn)
        assert len(np.unique(linear)) == len(grid)


class TestAssign:
    def _brute_force(self, q, p):
        bid = q // p
        bn = bid.max(axis=0) + 1
        linear = (
            bid[:, 0] + bn[0] * bid[:, 1] + bn[0] * bn[1] * bid[:, 2]
        )
        return bid, bn, linear

    def test_against_brute_force(self):
        g = np.random.default_rng(4)
        q = g.integers(0, 1000, (2000, 3))
        asg = blocks.assign(q, 16)
        _, bn, linear = self._brute_force(q, 16)
        assert np.array_equal(asg.bn, bn)
        assert np.array_equal(asg.block_ids, np.unique(linear))
        assert asg.counts.sum() == len(q)

    def test_block_ids_ascending_and_nonempty(self):
        g = np.random.default_rng(5)
        q = g.integers(0, 500, (1000, 3))
        asg = blocks.assign(q, 8)
        assert (np.diff(asg.block_ids) > 0).all()
        assert (asg.counts >= 1).all()

    def test_relative_in_range(self):
        g = np.random.default_rng(6)
        for p in [1, 2, 8, 64]:
            q = g.integers(0, 300, (500, 3))
            asg = blocks.assign(q, p)
            assert asg.rel.min() >= 0 and asg.rel.max() < p

    def test_perm_is_permutation(self):
        g = np.random.default_rng(7)
        q = g.integers(0, 100, (800, 3))
        asg = blocks.assign(q, 4)
        assert np.array_equal(np.sort(asg.perm), np.arange(800))

    def test_reconstruct_q_inverts(self):
        g = np.random.default_rng(8)
        for p in [1, 3, 16, 128]:
            q = g.integers(0, 2000, (1500, 3))
            asg = blocks.assign(q, p)
            q_rec = blocks.reconstruct_q(
                asg.block_ids, asg.counts, asg.rel, asg.bn, p
            )
            assert np.array_equal(q_rec, q[asg.perm])

    def test_stable_within_block(self):
        # Particles in one block keep their storage order (stable sort).
        q = np.array([[0, 0, 0], [50, 0, 0], [1, 0, 0], [0, 1, 0]])
        asg = blocks.assign(q, 100)  # everything in one block
        assert asg.perm.tolist() == [0, 1, 2, 3]

    def test_block_id_derivable_from_quantized(self):
        # Eq. 6's point: bid == q // p, no second float pass.
        g = np.random.default_rng(9)
        coords = g.uniform(0, 10, (500, 3))
        eb, p = 1e-2, 8
        q, mins = quantize.quantize(coords, eb)
        asg = blocks.assign(q, p)
        block_size = 2 * eb * p
        direct = np.floor((coords - mins) / block_size).astype(np.int64)
        assert np.array_equal(q // p, direct)
