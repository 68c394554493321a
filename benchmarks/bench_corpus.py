"""Corpus-level benchmarks: per-dataset end-to-end cost for the accuracy
tables (T3/T5) and the RecordBreaker baseline."""
import pytest

pytestmark = pytest.mark.benchmark(min_rounds=2, warmup=False)

from repro.baseline.recordbreaker import run_recordbreaker
from repro.core.extract import Params, run_datamaran
from repro.loggen import github100, render


@pytest.fixture(scope="module")
def gh_dataset():
    spec = github100()[2]  # a clean S(NI) dataset
    text, _ = render(spec)
    return text


def test_datamaran_exhaustive_per_dataset(benchmark, gh_dataset):
    benchmark(lambda: run_datamaran(gh_dataset, Params(exhaustive=True)))


def test_datamaran_greedy_per_dataset(benchmark, gh_dataset):
    benchmark(lambda: run_datamaran(gh_dataset, Params(exhaustive=False)))


def test_recordbreaker_per_dataset(benchmark, gh_dataset):
    benchmark(lambda: run_recordbreaker(gh_dataset))
