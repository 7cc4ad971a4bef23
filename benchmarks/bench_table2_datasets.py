"""Benchmark: Table 2 — synthetic dataset generation.

Regenerates the lite graphs (the workload behind every other experiment) and
checks the registry invariants while timing generation + CSR build.
"""
import pytest

from repro.graphs import generators as gen


@pytest.mark.parametrize("name", gen.SMALL_DATASETS)
def test_bench_generate_small(benchmark, name):
    def build():
        n, directed, src, dst = gen.REGISTRY[name]()
        return n, src.size

    n, m = benchmark.pedantic(build, rounds=3, iterations=1)
    assert n == gen.load(name).n


@pytest.mark.parametrize("name", ["DB-lite", "IC-lite"])
def test_bench_generate_large(benchmark, name):
    def build():
        n, directed, src, dst = gen.REGISTRY[name]()
        return src.size

    m = benchmark.pedantic(build, rounds=1, iterations=1)
    assert m > 100_000
