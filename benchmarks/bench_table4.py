"""Benchmark for Table 4: RMI location prediction with and without the key
re-scaling module (the quality ablation lives in jobs/table4.py; here the
latency of the predict path is pinned, showing re-scaling adds no
meaningful overhead)."""
import pytest

from repro.core.core_model import CoreModel, CoreModelConfig


@pytest.mark.parametrize("rescale", [False, True], ids=["no-rescale", "rescale"])
def test_predict_locations(benchmark, bench_corpus, bench_query_cycle, rescale):
    cm = CoreModel(CoreModelConfig(h=10, pad=16, rescale=rescale)).fit(
        bench_corpus.emb
    )
    queries = bench_query_cycle()

    def run():
        return cm.predict_locations(next(queries))

    keys, locs = benchmark(run)
    assert locs.shape == (10,)
