"""Tests for the BePI-lite baseline: index construction, persistence, and
query correctness against the exact ground truth."""
import numpy as np
import pytest

from repro.bepi import BepiIndex, bepi_query, build_bepi_index
from repro.graphs.generators import chung_lu, erdos_renyi, figure1_graph, with_dead_ends
from repro.linalg.exact import exact_ppr, l1_error

ALPHA = 0.2


@pytest.fixture(scope="module")
def cl(spark):
    return chung_lu(spark, n=150, avg_deg=5.0, seed=61)


@pytest.fixture(scope="module")
def cl_idx(cl):
    return build_bepi_index(cl, max_block=40, hub_frac=0.05)


@pytest.fixture(scope="module")
def deadg(spark):
    return with_dead_ends(spark, n=60, m=200, n_dead=8, seed=62)


class TestBuild:
    def test_partition_is_complete_and_disjoint(self, cl, cl_idx):
        both = np.concatenate([cl_idx.hubs, cl_idx.nonhub])
        assert len(both) == cl.n
        assert len(np.unique(both)) == cl.n

    def test_blocks_respect_cap(self, cl_idx):
        assert cl_idx.block_sizes.sum() == len(cl_idx.nonhub)
        assert all(inv.shape == (sz, sz) for inv, sz in zip(cl_idx.inverses, cl_idx.block_sizes))

    def test_no_intra_nonhub_cross_block_edges(self, cl, cl_idx):
        """Block-diagonality of H11: no edge may connect two different
        blocks of non-hub nodes."""
        edges = cl.edges.toPandas()
        block_of = np.full(cl.n, -1, dtype=np.int64)
        for k, sl in enumerate(cl_idx.block_slices()):
            block_of[cl_idx.nonhub[sl]] = k
        src_b = block_of[edges["src"].to_numpy()]
        dst_b = block_of[edges["dst"].to_numpy()]
        both_nonhub = (src_b >= 0) & (dst_b >= 0)
        assert (src_b[both_nonhub] == dst_b[both_nonhub]).all()

    def test_cross_matrix_entry_counts(self, cl, cl_idx):
        edges = cl.edges.toPandas()
        hub_set = set(cl_idx.hubs.tolist())
        hs = edges["src"].isin(hub_set).to_numpy()
        hd = edges["dst"].isin(hub_set).to_numpy()
        assert cl_idx.m12[0].size == int((hs & ~hd).sum())
        assert cl_idx.m21[0].size == int((~hs & hd).sum())
        assert cl_idx.m22[0].size == int((hs & hd).sum())

    def test_build_time_recorded(self, cl_idx):
        assert cl_idx.build_seconds > 0
        assert cl_idx.stats["n_hubs"] >= 1


class TestQuery:
    @pytest.mark.parametrize("s", [0, 7, 42])
    def test_matches_exact(self, cl, cl_idx, s):
        truth = exact_ppr(cl.to_csr(), s, ALPHA)
        res = bepi_query(cl_idx, s, delta=1e-10)
        assert l1_error(res.pi, truth) < 1e-7

    def test_distribution(self, cl, cl_idx):
        res = bepi_query(cl_idx, 3, delta=1e-10)
        assert res.pi.sum() == pytest.approx(1.0, abs=1e-7)
        assert (res.pi >= -1e-15).all()

    def test_deltas_decrease_geometrically(self, cl_idx):
        res = bepi_query(cl_idx, 0, delta=1e-10)
        d = res.deltas
        assert len(d) >= 3
        # 1-norm contraction ≤ (1−α): allow slack for the ℓ2 metric
        assert d[-1] < d[0]
        assert all(b <= a * 0.95 + 1e-16 for a, b in zip(d[2:], d[3:]))

    def test_dead_end_graph_exact_correction(self, deadg):
        idx = build_bepi_index(deadg, max_block=30, hub_frac=0.05)
        for s in (0, 5):
            truth = exact_ppr(deadg.to_csr(), s, ALPHA)
            res = bepi_query(idx, s, delta=1e-11)
            assert l1_error(res.pi, truth) < 1e-7

    def test_hub_source(self, cl, cl_idx):
        s = int(cl_idx.hubs[0])
        truth = exact_ppr(cl.to_csr(), s, ALPHA)
        res = bepi_query(cl_idx, s, delta=1e-10)
        assert l1_error(res.pi, truth) < 1e-7

    def test_loose_delta_gives_looser_result(self, cl, cl_idx):
        truth = exact_ppr(cl.to_csr(), 0, ALPHA)
        loose = bepi_query(cl_idx, 0, delta=1e-2)
        tight = bepi_query(cl_idx, 0, delta=1e-10)
        assert l1_error(tight.pi, truth) <= l1_error(loose.pi, truth) + 1e-15
        assert loose.iterations <= tight.iterations


class TestPersistence:
    def test_save_load_roundtrip(self, cl, cl_idx, tmp_path):
        p = str(tmp_path / "bepi.npz")
        cl_idx.save(p)
        assert cl_idx.size_bytes > 0
        loaded = BepiIndex.load(p)
        res_a = bepi_query(cl_idx, 1, delta=1e-10)
        res_b = bepi_query(loaded, 1, delta=1e-10)
        assert np.allclose(res_a.pi, res_b.pi, atol=1e-14)

    def test_size_grows_with_density(self, spark):
        sparse = erdos_renyi(spark, n=120, m=360, seed=63)
        dense = erdos_renyi(spark, n=120, m=2400, seed=64)
        i_sparse = build_bepi_index(sparse, max_block=40, hub_frac=0.05)
        i_dense = build_bepi_index(dense, max_block=40, hub_frac=0.05)
        assert i_dense.size_bytes > i_sparse.size_bytes
