"""Tests for IVFPQ / IVFPQ-HNSW."""
import numpy as np
import pytest

from repro.baselines.ivfpq import IVFPQHNSWIndex, IVFPQIndex
from repro.metrics import recall_at_k


@pytest.fixture(scope="module")
def fitted(corpus_small):
    return IVFPQIndex(m=8, b=6, p=4).fit(corpus_small.emb)


class TestIVFPQ:
    def test_default_list_count_is_sqrt_n(self, fitted, corpus_small):
        assert fitted.centroids.shape[0] == int(np.sqrt(corpus_small.n))

    def test_inverted_lists_partition_corpus(self, fitted, corpus_small):
        assert fitted.list_starts[-1] == corpus_small.n
        assert np.array_equal(np.sort(fitted.sorted_rows), np.arange(corpus_small.n))

    def test_lists_grouped_contiguously(self, fitted):
        # Rows between starts[j] and starts[j+1] all belong to list j.
        assign = np.empty(fitted.sorted_rows.shape[0], dtype=np.int64)
        for j in range(fitted.centroids.shape[0]):
            assign[fitted.list_starts[j] : fitted.list_starts[j + 1]] = j
        assert (np.diff(assign) >= 0).all()

    def test_search_contract(self, fitted, queries_small):
        out = fitted.search(queries_small.emb[0], 50)
        assert out.shape == (50,) and len(set(out.tolist())) == 50

    def test_recall_reasonable(self, fitted, queries_small, truth_small):
        ranked = [fitted.search(q, 100) for q in queries_small.emb[:20]]
        assert recall_at_k(ranked, truth_small[:20], 100) > 0.3

    def test_more_probes_not_worse(self, corpus_small, queries_small, truth_small):
        lo = IVFPQIndex(m=8, b=6, p=1).fit(corpus_small.emb)
        hi = IVFPQIndex(m=8, b=6, p=16).fit(corpus_small.emb)
        r_lo = recall_at_k([lo.search(q, 100) for q in queries_small.emb[:20]], truth_small[:20], 100)
        r_hi = recall_at_k([hi.search(q, 100) for q in queries_small.emb[:20]], truth_small[:20], 100)
        assert r_hi >= r_lo

    def test_explicit_c(self, corpus_small):
        idx = IVFPQIndex(m=8, b=4, p=2, c=10).fit(corpus_small.emb)
        assert idx.centroids.shape[0] == 10

    def test_custom_ids(self, corpus_small, queries_small):
        ids = np.arange(corpus_small.n) + 7
        idx = IVFPQIndex(m=8, b=4, p=4, c=16).fit(corpus_small.emb, ids)
        assert (idx.search(queries_small.emb[0], 10) >= 7).all()

    def test_nbytes_much_smaller_than_data(self, fitted, corpus_small):
        assert fitted.nbytes < corpus_small.emb.nbytes


class TestIVFPQHNSW:
    @pytest.fixture(scope="class")
    def hnsw_fitted(self, corpus_small):
        return IVFPQHNSWIndex(m=8, b=6, p=4).fit(corpus_small.emb)

    def test_hnsw_built_over_centroids(self, hnsw_fitted):
        assert hnsw_fitted.hnsw.vectors.shape[0] == hnsw_fitted.centroids.shape[0]

    def test_search_contract(self, hnsw_fitted, queries_small):
        out = hnsw_fitted.search(queries_small.emb[1], 20)
        assert out.shape == (20,)

    def test_probe_lists_close_to_bruteforce(self, hnsw_fitted, queries_small):
        """HNSW probe selection overlaps heavily with the exact coarse scan."""
        overlaps = []
        for q in queries_small.emb[:20]:
            exact = set(IVFPQIndex._probe_lists(hnsw_fitted, q, 4).tolist())
            via_hnsw = set(hnsw_fitted._probe_lists(q, 4).tolist())
            overlaps.append(len(exact & via_hnsw) / 4)
        assert np.mean(overlaps) > 0.7

    def test_quality_close_to_ivfpq(self, fitted, hnsw_fitted, queries_small, truth_small):
        r_exact = recall_at_k(
            [fitted.search(q, 100) for q in queries_small.emb[:20]], truth_small[:20], 100
        )
        r_hnsw = recall_at_k(
            [hnsw_fitted.search(q, 100) for q in queries_small.emb[:20]], truth_small[:20], 100
        )
        assert r_hnsw >= 0.8 * r_exact

    def test_nbytes_includes_graph(self, hnsw_fitted):
        assert hnsw_fitted.nbytes > IVFPQIndex.nbytes.fget(hnsw_fitted)
