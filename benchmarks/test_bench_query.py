"""Query-latency benchmarks: RAMBO vs BIGSI at two corpus sizes (E1/E2).

Each benchmark answers a fixed 500-query batch through the driver engine.
Expected shape (the paper's result): RAMBO is faster than BIGSI at equal
Bloom load, and its advantage is larger at N=1000 than at N=300.
"""
import pytest


def _batch(index, queries):
    def go():
        for c in queries:
            index.query(int(c))

    return go


@pytest.mark.parametrize("system", ["bigsi", "rambo"])
def test_query_small_corpus(benchmark, indexes_small, inputs_small, system):
    benchmark.extra_info["n_files"] = inputs_small.n_files
    benchmark.extra_info["ncols"] = indexes_small[system].ncols
    benchmark(_batch(indexes_small[system], inputs_small.queries[:500]))


@pytest.mark.parametrize("system", ["bigsi", "rambo"])
def test_query_large_corpus(benchmark, indexes_large, inputs_large, system):
    benchmark.extra_info["n_files"] = inputs_large.n_files
    benchmark.extra_info["ncols"] = indexes_large[system].ncols
    benchmark(_batch(indexes_large[system], inputs_large.queries[:500]))


@pytest.mark.parametrize("system", ["bigsi", "rambo"])
def test_query_positive_only(benchmark, indexes_large, inputs_large, system):
    """Hit-heavy workload: every query is a present k-mer (decode-heavy
    path for RAMBO since every repetition has at least one hit)."""
    truth = inputs_large.truth
    benchmark(_batch(indexes_large[system], truth.codes[:500]))
