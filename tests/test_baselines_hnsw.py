"""Tests for the from-scratch HNSW graph."""
import numpy as np
import pytest

from repro.baselines.hnsw import HNSW
from repro.embeddings.corpus import exact_topk, make_corpus
from repro.metrics import recall_at_k


@pytest.fixture(scope="module")
def vectors():
    return make_corpus(400, dim=16, seed=8).emb


@pytest.fixture(scope="module")
def graph(vectors):
    return HNSW(m=8, ef_construction=64, seed=0).fit(vectors)


class TestBuild:
    def test_levels_assigned(self, graph, vectors):
        assert graph.levels.shape == (400,)
        assert graph.max_level == graph.levels.max()

    def test_entry_is_top_level_node(self, graph):
        assert graph.levels[graph.entry] == graph.max_level

    def test_level_distribution_geometric(self):
        g = HNSW(m=8, seed=1).fit(make_corpus(2000, dim=8, seed=1).emb)
        frac0 = (g.levels == 0).mean()
        assert frac0 > 0.5  # most nodes live only on the base layer

    def test_base_layer_connected_degree(self, graph):
        degs = [len(nb) for nb in graph.layers[0]]
        assert max(degs) <= 2 * graph.m + 1
        assert np.mean([d > 0 for d in degs]) > 0.99

    def test_neighbor_lists_symmetricish(self, graph):
        # Pruning can drop one direction, but most links are bidirectional.
        both = 0
        total = 0
        for node, nbs in enumerate(graph.layers[0][:100]):
            for nb in nbs:
                total += 1
                both += node in graph.layers[0][nb]
        assert total > 0 and both / total > 0.5

    def test_empty_raises(self):
        with pytest.raises(ValueError):
            HNSW().fit(np.empty((0, 4), dtype=np.float32))

    def test_invalid_m_raises(self):
        with pytest.raises(ValueError):
            HNSW(m=1)

    def test_deterministic(self, vectors):
        a = HNSW(m=8, seed=3).fit(vectors)
        b = HNSW(m=8, seed=3).fit(vectors)
        assert np.array_equal(a.levels, b.levels)
        assert a.layers[0] == b.layers[0]


class TestSearch:
    def test_high_ef_near_exact(self, graph, vectors):
        truth = exact_topk(vectors, vectors[:30], 10)
        ranked = [graph.search(v, 10, ef=200) for v in vectors[:30]]
        assert recall_at_k(ranked, truth, 10) > 0.95

    def test_self_is_found(self, graph, vectors):
        for i in (0, 123, 399):
            assert i in graph.search(vectors[i], 3, ef=64)

    def test_k_respected(self, graph, vectors):
        assert graph.search(vectors[0], 7).shape == (7,)

    def test_results_sorted_by_similarity(self, graph, vectors):
        q = vectors[5]
        ids = graph.search(q, 10, ef=100)
        sims = vectors[ids] @ q
        assert (np.diff(sims) <= 1e-6).all()

    def test_larger_ef_not_worse(self, graph, vectors):
        truth = exact_topk(vectors, vectors[:20], 10)
        lo = recall_at_k([graph.search(v, 10, ef=10) for v in vectors[:20]], truth, 10)
        hi = recall_at_k([graph.search(v, 10, ef=150) for v in vectors[:20]], truth, 10)
        assert hi >= lo

    def test_search_before_fit_raises(self):
        with pytest.raises(RuntimeError):
            HNSW().search(np.zeros(4, dtype=np.float32), 1)

    def test_nbytes_positive(self, graph):
        assert graph.nbytes > 0
