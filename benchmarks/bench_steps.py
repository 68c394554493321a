"""Benchmarks for the three DATAMARAN steps (paper Table 3 / T2).

Each benchmark isolates one step at the default sampling sizes so the
per-step costs in EXPERIMENTS.md can be regenerated:

    pytest benchmarks/bench_steps.py --benchmark-only -q
"""
import pytest

pytestmark = pytest.mark.benchmark(min_rounds=2, warmup=False)

from repro.core.extract import Params
from repro.core.generation import generate_candidates, sample_lines
from repro.core.parsing import line_starts_of
from repro.core.pruning import prune
from repro.core.refine import evaluate_candidates
from repro.loggen import DatasetSpec, render
from repro.loggen.corpus import fam_syslog


@pytest.fixture(scope="module")
def dataset():
    spec = DatasetSpec(
        "bench", "S(NI)", (fam_syslog("s", dirty=True),), (1.0,), 0.05, 120_000, 7
    )
    text, _ = render(spec)
    return text


@pytest.fixture(scope="module")
def candidates(dataset):
    return generate_candidates(dataset, alpha=10, max_span=10)


def test_generation_exhaustive(benchmark, dataset):
    benchmark(lambda: generate_candidates(dataset, alpha=10, max_span=10))


def test_generation_greedy(benchmark, dataset):
    benchmark(
        lambda: generate_candidates(dataset, alpha=10, max_span=10, exhaustive=False)
    )


def test_pruning(benchmark, candidates):
    benchmark(lambda: prune(candidates, 50))


def test_evaluation(benchmark, dataset, candidates):
    params = Params()
    sample = sample_lines(dataset, params.eval_sample_bytes)
    ls = line_starts_of(sample)
    kept = prune(candidates, params.top_m)
    benchmark(lambda: evaluate_candidates(kept, sample, ls))
