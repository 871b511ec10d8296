"""Benchmark for Table 3: average ESK-LSH expansion time of a standalone
core model at H = 32 / 48 / 64 (paper: tiny time overhead for large
quality gains from more arrays)."""
import pytest

from repro.core.core_model import CoreModel, CoreModelConfig

K = 100


@pytest.mark.parametrize("h", [32, 48, 64])
def test_expansion_time(benchmark, bench_corpus, bench_query_cycle, h):
    cm = CoreModel(CoreModelConfig(h=h)).fit(bench_corpus.emb)
    queries = bench_query_cycle()

    def run():
        # candidate_rows = hashkey generation + RMI prediction + expansion,
        # exactly the stage Table 3 times.
        return cm.candidate_rows(next(queries), K)

    out = benchmark(run)
    assert out.size > 0
