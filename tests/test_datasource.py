"""Tests for the "lider" Python DataSource: partition pruning by the
centroids retriever, cluster_id filter pushdown, and result equality with
the in-memory index."""
import json

import numpy as np
import pytest

from repro.core.lider import LIDER, LIDERConfig
from repro.datasource import register_lider_source, save_lider_index
from repro.datasource.lider_source import LiderReader, ann_search_df
from pyspark.sql.datasource import EqualTo, GreaterThan, In


@pytest.fixture(scope="module")
def saved_index(tmp_path_factory, corpus_small, clustered_small):
    cents, assign = clustered_small
    lider = LIDER(LIDERConfig(c=8, c0=4)).fit(
        corpus_small.emb, assignments=assign, centroids=cents
    )
    path = str(tmp_path_factory.mktemp("lider_idx"))
    save_lider_index(lider, path)
    return path, lider


@pytest.fixture(scope="module")
def spark_registered(spark):
    register_lider_source(spark)
    return spark


class TestLayout:
    def test_files_written(self, saved_index):
        import os

        path, lider = saved_index
        assert os.path.exists(os.path.join(path, "index", "meta.json"))
        assert os.path.exists(os.path.join(path, "index", "centroid_retriever.pkl"))
        for j in lider.in_cluster:
            assert os.path.exists(os.path.join(path, "index", f"cluster_{j}.pkl"))
            assert os.path.isdir(os.path.join(path, "embeddings", f"cluster_id={j}"))

    def test_pickles_are_embedding_free(self, saved_index):
        import os
        import pickle

        path, lider = saved_index
        j = next(iter(lider.in_cluster))
        with open(os.path.join(path, "index", f"cluster_{j}.pkl"), "rb") as f:
            cm = pickle.load(f)
        assert cm.emb is None and cm.ids is not None


class TestReaderPlanning:
    def _reader(self, path, query=None, **kw):
        opts = {"path": path, **kw}
        if query is not None:
            opts["query"] = json.dumps([float(x) for x in query])
        return LiderReader(opts)

    def test_full_scan_plans_all_clusters(self, saved_index):
        path, lider = saved_index
        parts = self._reader(path).partitions()
        assert {p.value for p in parts} == set(lider.in_cluster)

    def test_query_plans_c0_partitions(self, saved_index, queries_small):
        path, lider = saved_index
        parts = self._reader(path, query=queries_small.emb[0]).partitions()
        _, c0 = lider.config.resolve(lider.assignments.shape[0])
        assert len(parts) == c0

    def test_query_partitions_are_cr_choice(self, saved_index, queries_small):
        path, lider = saved_index
        q = queries_small.emb[1]
        parts = self._reader(path, query=q).partitions()
        expect, _ = lider.centroid_retriever.search(q, km=4)
        assert [p.value for p in parts] == [int(j) for j in expect]

    def test_c0_option_overrides(self, saved_index, queries_small):
        path, _ = saved_index
        parts = self._reader(path, query=queries_small.emb[0], c0=2).partitions()
        assert len(parts) == 2

    def test_pushed_equalto_prunes(self, saved_index):
        path, _ = saved_index
        r = self._reader(path)
        leftover = list(r.pushFilters([EqualTo(("cluster_id",), 3)]))
        assert leftover == []
        assert [p.value for p in r.partitions()] == [3]

    def test_pushed_in_prunes(self, saved_index):
        path, _ = saved_index
        r = self._reader(path)
        list(r.pushFilters([In(("cluster_id",), (1, 2))]))
        assert {p.value for p in r.partitions()} == {1, 2}

    def test_unsupported_filters_returned(self, saved_index):
        path, _ = saved_index
        r = self._reader(path)
        f = GreaterThan(("score",), 0.5)
        assert list(r.pushFilters([f])) == [f]

    def test_missing_path_raises(self):
        with pytest.raises(ValueError):
            LiderReader({})


class TestReadEnd2End:
    def test_search_matches_in_memory_lider(
        self, spark_registered, saved_index, queries_small
    ):
        path, lider = saved_index
        for q in queries_small.emb[:5]:
            got = [r["id"] for r in ann_search_df(spark_registered, path, q, k=20).collect()]
            want = [int(x) for x in lider.search(q, 20)[0]]
            assert got == want

    def test_scores_descending(self, spark_registered, saved_index, queries_small):
        path, _ = saved_index
        rows = ann_search_df(spark_registered, path, queries_small.emb[6], k=15).collect()
        scores = [r["score"] for r in rows]
        assert scores == sorted(scores, reverse=True)

    def test_full_scan_returns_whole_corpus(self, spark_registered, saved_index, corpus_small):
        path, _ = saved_index
        df = spark_registered.read.format("lider").option("path", path).load()
        assert df.count() == corpus_small.n

    def test_filter_pushdown_count(self, spark_registered, saved_index):
        path, lider = saved_index
        df = (
            spark_registered.read.format("lider").option("path", path).load()
            .filter("cluster_id = 2")
        )
        assert df.count() == int((lider.assignments == 2).sum())

    def test_schema(self, spark_registered, saved_index):
        path, _ = saved_index
        df = spark_registered.read.format("lider").option("path", path).load()
        assert [f.name for f in df.schema.fields] == ["id", "cluster_id", "score", "rank"]
