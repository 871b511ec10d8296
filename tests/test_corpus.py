"""Tests for the synthetic embedding corpus / query generator."""
import numpy as np
import pytest

from repro.embeddings.corpus import (
    EmbeddingCorpus,
    exact_topk,
    make_corpus,
    make_queries,
)


class TestMakeCorpus:
    def test_shapes(self, corpus_small):
        assert corpus_small.emb.shape == (2000, 32)
        assert corpus_small.semantic.shape == (2000, 32)
        assert corpus_small.topic.shape == (2000,)
        assert corpus_small.ids.shape == (2000,)

    def test_unit_norm(self, corpus_small):
        assert np.linalg.norm(corpus_small.emb, axis=1) == pytest.approx(1.0, abs=1e-5)
        assert np.linalg.norm(corpus_small.semantic, axis=1) == pytest.approx(1.0, abs=1e-5)

    def test_deterministic(self):
        a = make_corpus(100, dim=8, seed=1)
        b = make_corpus(100, dim=8, seed=1)
        assert np.array_equal(a.emb, b.emb)

    def test_seed_changes_data(self):
        a = make_corpus(100, dim=8, seed=1)
        b = make_corpus(100, dim=8, seed=2)
        assert not np.array_equal(a.emb, b.emb)

    def test_topics_cluster(self):
        """Same-topic passages are more similar than cross-topic ones."""
        c = make_corpus(1000, dim=32, n_topics=4, seed=0)
        sims = c.semantic @ c.semantic.T
        same = sims[c.topic[:, None] == c.topic[None, :]]
        diff = sims[c.topic[:, None] != c.topic[None, :]]
        assert same.mean() > diff.mean() + 0.2

    def test_default_topic_count(self):
        c = make_corpus(5000, dim=16, seed=0)
        assert c.topic.max() < 10  # 5000 // 500

    def test_invalid_n_raises(self):
        with pytest.raises(ValueError):
            make_corpus(0)

    def test_float32(self, corpus_small):
        assert corpus_small.emb.dtype == np.float32

    def test_embedding_close_to_semantic(self, corpus_small):
        cos = (corpus_small.emb * corpus_small.semantic).sum(1)
        assert cos.mean() > 0.9  # encoder noise is moderate


class TestMakeQueries:
    def test_shapes(self, corpus_small, queries_small):
        assert queries_small.emb.shape == (40, 32)
        assert len(queries_small.relevant) == 40

    def test_targets_are_relevant(self, queries_small):
        for t, rel in zip(queries_small.target, queries_small.relevant):
            assert int(t) in rel

    def test_query_near_target(self, corpus_small, queries_small):
        cos = (queries_small.emb * corpus_small.emb[queries_small.target]).sum(1)
        assert cos.mean() > 0.5

    def test_deterministic(self, corpus_small):
        a = make_queries(corpus_small, 10, seed=3)
        b = make_queries(corpus_small, 10, seed=3)
        assert np.array_equal(a.emb, b.emb) and np.array_equal(a.target, b.target)

    def test_graded_qrels(self, corpus_small):
        qs = make_queries(corpus_small, 5, graded=True, grade_bands=(2, 3, 5), seed=9)
        assert qs.qrels is not None and len(qs.qrels) == 5
        for rel in qs.qrels:
            assert len(rel) == 10
            grades = sorted(rel.values(), reverse=True)
            assert grades[:2] == [3.0, 3.0] and set(grades) <= {1.0, 2.0, 3.0}

    def test_graded_top_passages_by_semantic_sim(self, corpus_small):
        qs = make_queries(corpus_small, 3, graded=True, seed=9)
        for i, rel in enumerate(qs.qrels):
            scores = corpus_small.semantic @ qs.semantic[i]
            judged = np.array(sorted(rel, key=rel.get, reverse=True))
            # grade-3 docs must be among the semantically closest.
            top3 = set(np.argsort(-scores)[:3])
            g3 = {p for p, g in rel.items() if g == 3.0}
            assert g3 == top3

    def test_binary_queries_have_no_qrels(self, queries_small):
        assert queries_small.qrels is None


class TestExactTopK:
    def test_matches_naive(self, corpus_small, queries_small):
        got = exact_topk(corpus_small.emb, queries_small.emb[:5], 10)
        for i in range(5):
            naive = np.argsort(-(corpus_small.emb @ queries_small.emb[i]))[:10]
            assert np.array_equal(got[i], naive)

    def test_k_larger_than_corpus(self):
        c = make_corpus(5, dim=8, seed=0)
        out = exact_topk(c.emb, c.emb[:2], 100)
        assert out.shape == (2, 5)

    def test_self_is_top1(self, corpus_small):
        out = exact_topk(corpus_small.emb, corpus_small.emb[:10], 1)
        assert np.array_equal(out[:, 0], np.arange(10))
