"""Tests for PQ / OPQ / PCA-PQ."""
import numpy as np
import pytest

from repro.baselines.pq import OPQIndex, PCAPQIndex, PQIndex, _PQCodec, segment_kmeans
from repro.embeddings.corpus import exact_topk
from repro.metrics import recall_at_k


class TestSegmentKMeans:
    def test_codebook_shape(self):
        x = np.random.default_rng(0).standard_normal((500, 4)).astype(np.float32)
        assert segment_kmeans(x, 16, seed=1).shape == (16, 4)

    def test_k_capped_by_n(self):
        x = np.random.default_rng(0).standard_normal((5, 4)).astype(np.float32)
        assert segment_kmeans(x, 16, seed=1).shape[0] == 5

    def test_deterministic(self):
        x = np.random.default_rng(0).standard_normal((200, 4)).astype(np.float32)
        assert np.array_equal(segment_kmeans(x, 8, seed=2), segment_kmeans(x, 8, seed=2))

    def test_separated_clusters_recovered(self):
        g = np.random.default_rng(3)
        centers = np.array([[0, 0], [10, 0], [0, 10], [10, 10]], dtype=np.float32)
        x = (centers[g.integers(0, 4, 400)] + 0.1 * g.standard_normal((400, 2))).astype(np.float32)
        cb = segment_kmeans(x, 4, seed=0)
        d = np.abs(cb[:, None, :] - centers[None, :, :]).sum(-1).min(axis=1)
        assert (d < 1.0).all()


class TestCodec:
    @pytest.fixture(scope="class")
    def codec_and_data(self):
        g = np.random.default_rng(1)
        x = g.standard_normal((800, 16)).astype(np.float32)
        x /= np.linalg.norm(x, axis=1, keepdims=True)
        codec = _PQCodec(m=4, b=4, seed=0).train(x)
        return codec, x

    def test_codes_shape_dtype(self, codec_and_data):
        codec, x = codec_and_data
        codes = codec.encode(x)
        assert codes.shape == (800, 4) and codes.dtype == np.uint8

    def test_decode_shape(self, codec_and_data):
        codec, x = codec_and_data
        assert codec.decode(codec.encode(x)).shape == x.shape

    def test_reconstruction_better_than_random(self, codec_and_data):
        codec, x = codec_and_data
        recon = codec.decode(codec.encode(x))
        err = np.linalg.norm(x - recon, axis=1).mean()
        base = np.linalg.norm(x - x[::-1], axis=1).mean()
        assert err < 0.5 * base

    def test_adc_approximates_inner_product(self, codec_and_data):
        codec, x = codec_and_data
        codes = codec.encode(x)
        q = x[0]
        approx = codec.adc_scores(codes, codec.ip_tables(q))
        exact = x @ q
        assert np.corrcoef(approx, exact)[0, 1] > 0.75

    def test_more_bits_reduce_error(self):
        g = np.random.default_rng(2)
        x = g.standard_normal((600, 16)).astype(np.float32)
        e = {}
        for b in (2, 6):
            codec = _PQCodec(m=4, b=b, seed=0).train(x)
            recon = codec.decode(codec.encode(x))
            e[b] = np.linalg.norm(x - recon, axis=1).mean()
        assert e[6] < e[2]

    def test_indivisible_dim_raises(self):
        codec = _PQCodec(m=5, b=2)
        with pytest.raises(ValueError):
            codec.train(np.zeros((10, 16), dtype=np.float32))

    def test_invalid_params_raise(self):
        with pytest.raises(ValueError):
            _PQCodec(m=0, b=2)


class TestPQFamily:
    @pytest.fixture(scope="class")
    def data(self, corpus_small, queries_small, truth_small):
        return corpus_small.emb, queries_small.emb, truth_small

    @pytest.mark.parametrize("cls", [PQIndex, OPQIndex, PCAPQIndex])
    def test_search_contract(self, cls, data):
        emb, q, _ = data
        idx = cls(m=8, b=6).fit(emb)
        out = idx.search(q[0], 25)
        assert out.shape == (25,) and len(set(out.tolist())) == 25

    @pytest.mark.parametrize("cls", [PQIndex, OPQIndex, PCAPQIndex])
    def test_recall_beats_random(self, cls, data):
        emb, qs, truth = data
        idx = cls(m=8, b=6).fit(emb)
        ranked = [idx.search(q, 100) for q in qs[:20]]
        # Random top-100 of 2000 would land recall ≈ 0.05.
        assert recall_at_k(ranked, truth[:20], 100) > 0.3

    def test_opq_rotation_orthonormal(self, data):
        emb, _, _ = data
        idx = OPQIndex(m=8, b=4, opq_iters=2).fit(emb)
        rtr = idx.rotation.T @ idx.rotation
        assert np.allclose(rtr, np.eye(emb.shape[1]), atol=1e-4)

    def test_opq_reconstruction_not_worse_than_pq(self, data):
        emb, _, _ = data
        pq = PQIndex(m=8, b=4).fit(emb)
        opq = OPQIndex(m=8, b=4, opq_iters=3).fit(emb)
        pq_err = np.linalg.norm(emb - pq.codec.decode(pq.codes), axis=1).mean()
        rot = emb @ opq.rotation
        opq_err = np.linalg.norm(rot - opq.codec.decode(opq.codes), axis=1).mean()
        assert opq_err <= pq_err * 1.02

    def test_pca_projection_orthonormal_columns(self, data):
        emb, _, _ = data
        idx = PCAPQIndex(m=8, b=4, pca_dim=16).fit(emb)
        ptp = idx.projection.T @ idx.projection
        assert np.allclose(ptp, np.eye(16), atol=1e-4)

    def test_pca_dim_must_divide_m(self, data):
        emb, _, _ = data
        with pytest.raises(ValueError):
            PCAPQIndex(m=8, b=4, pca_dim=20).fit(emb)

    def test_custom_ids(self, data):
        emb, qs, _ = data
        ids = np.arange(emb.shape[0]) + 500
        idx = PQIndex(m=8, b=4).fit(emb, ids)
        assert (idx.search(qs[0], 10) >= 500).all()

    @pytest.mark.parametrize("cls", [PQIndex, OPQIndex, PCAPQIndex])
    def test_nbytes_much_smaller_than_data(self, cls, data):
        emb, _, _ = data
        idx = cls(m=8, b=6).fit(emb)
        assert idx.nbytes < emb.nbytes
