"""Tests for the dataset registry and Spark corpus IO."""
import numpy as np
import pytest

from repro.embeddings.corpus import make_corpus
from repro.embeddings.datasets import (
    DATASETS,
    FAMILIES,
    corpus_to_pandas,
    corpus_to_spark,
    dev_queries,
    load_dataset,
    nq_queries,
    spark_to_matrix,
    trec_queries,
)
from repro.oracle import assert_equivalent


class TestRegistry:
    def test_all_names_resolve_to_families(self):
        for spec in DATASETS.values():
            assert spec.family in FAMILIES
            assert spec.n <= FAMILIES[spec.family].master_n

    def test_subsets_are_prefixes_of_master(self):
        small = load_dataset("MSL-2k")
        bigger = load_dataset("MSL-10k")
        assert np.array_equal(small.emb, bigger.emb[:2000])

    def test_load_deterministic(self):
        a = load_dataset("MSL-2k")
        b = load_dataset("MSL-2k")
        assert np.array_equal(a.emb, b.emb)

    def test_sizes(self):
        assert load_dataset("MSL-2k").n == 2000

    def test_families_differ(self):
        # WIKI and MSL are distinct collections (different seed/profile).
        msl = load_dataset("MSL-2k")
        wiki = load_dataset("WIKI-200k")
        assert not np.array_equal(msl.emb, wiki.emb[:2000])

    def test_unknown_name_raises(self):
        with pytest.raises(KeyError):
            load_dataset("nope")


class TestQueryWorkloads:
    def test_dev_queries_binary(self):
        qs = dev_queries(load_dataset("MSL-2k"), 20)
        assert qs.n == 20 and qs.qrels is None

    def test_trec_queries_graded_default_43(self):
        qs = trec_queries(load_dataset("MSL-2k"))
        assert qs.n == 43 and qs.qrels is not None

    def test_nq_queries(self):
        qs = nq_queries(load_dataset("MSL-2k"), 10)
        assert qs.n == 10

    def test_workloads_deterministic(self):
        c = load_dataset("MSL-2k")
        assert np.array_equal(dev_queries(c, 5).emb, dev_queries(c, 5).emb)


class TestSparkIO:
    def test_pandas_conversion(self, corpus_small):
        pdf = corpus_to_pandas(corpus_small)
        assert list(pdf.columns) == ["id", "emb"] and len(pdf) == corpus_small.n

    def test_pandas_with_clusters(self, corpus_small, clustered_small):
        _, assign = clustered_small
        pdf = corpus_to_pandas(corpus_small, assign)
        assert "cluster_id" in pdf.columns

    def test_spark_round_trip(self, spark, corpus_small):
        df = corpus_to_spark(spark, corpus_small)
        ids, mat = spark_to_matrix(df)
        order = np.argsort(ids)
        assert np.array_equal(ids[order], corpus_small.ids)
        assert np.allclose(mat[order], corpus_small.emb, atol=1e-6)

    def test_spark_schema(self, spark, corpus_small, clustered_small):
        _, assign = clustered_small
        df = corpus_to_spark(spark, corpus_small, assign)
        assert [f.name for f in df.schema.fields] == ["id", "cluster_id", "emb"]

    def test_cluster_counts_match_duckdb_oracle(self, spark, corpus_small, clustered_small):
        """Spark groupBy over the corpus == DuckDB aggregation (result oracle
        exercising the provided assert_equivalent on our corpus frames)."""
        _, assign = clustered_small
        df = corpus_to_spark(spark, corpus_small, assign)
        got = df.groupBy("cluster_id").count().withColumnRenamed("count", "n")
        pdf = corpus_to_pandas(corpus_small, assign).drop(columns=["emb"])
        assert_equivalent(
            got,
            "SELECT cluster_id, COUNT(*) AS n FROM corpus GROUP BY cluster_id",
            corpus=pdf,
        )
