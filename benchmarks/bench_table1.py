"""Table 1 benchmarks: per-op sampling/update kernels for every method
at a fixed degree. Regenerates the raw numbers behind the complexity
table (`python jobs/table1_complexity.py` prints the full sweep)."""
import numpy as np
import pytest

from repro.bench.table1 import METHODS
from repro.synth_data import biases

D = 1024


@pytest.fixture(params=list(METHODS), ids=list(METHODS))
def method(request):
    return request.param


def _sampler(method):
    return METHODS[method](biases("powerlaw", D, seed=1, max_bias=4096))


def test_sample_one(benchmark, method):
    s = _sampler(method)
    rng = np.random.default_rng(2)
    benchmark(lambda: s.sample(rng, 1))


def test_sample_batch64(benchmark, method):
    s = _sampler(method)
    rng = np.random.default_rng(3)
    benchmark(lambda: s.sample(rng, 64))


def test_insert_delete_pair(benchmark, method):
    s = _sampler(method)
    rng = np.random.default_rng(4)

    def op():
        s.insert(17)
        s.delete(int(rng.integers(0, s.degree)))

    benchmark(op)
