"""Extraction-throughput benchmarks (paper Fig 14a / T6: for large
datasets the LL(1)-parser data-extraction dominates and is linear in
T_data; the Spark path distributes exactly this step)."""
import pytest

pytestmark = pytest.mark.benchmark(min_rounds=2, warmup=False)

from repro.core.extract import Params, extract_all, infer_structures
from repro.loggen import DatasetSpec, render
from repro.loggen.corpus import fam_json, fam_syslog


@pytest.fixture(scope="module")
def big_text():
    spec = DatasetSpec(
        "big", "S(NI)", (fam_syslog("s", dirty=True),), (1.0,), 0.05, 2_000_000, 9
    )
    text, _ = render(spec)
    return text


@pytest.fixture(scope="module")
def templates(big_text):
    return infer_structures(big_text).templates


def test_infer_structures_2mb(benchmark, big_text):
    # inference cost is sample-bounded: independent of total size
    benchmark(lambda: infer_structures(big_text))


def test_extract_2mb_driver(benchmark, big_text, templates):
    result = benchmark(lambda: extract_all(big_text, templates))
    assert len(result.records) > 10_000


def test_extract_2mb_spark(benchmark, spark, tmp_path_factory, big_text, templates):
    from repro.core.spark_ext import extract_spark, read_lines

    p = tmp_path_factory.mktemp("bench") / "big.log"
    p.write_text(big_text)
    df_lines = read_lines(spark, str(p)).cache()
    df_lines.count()  # materialize

    def run():
        return extract_spark(spark, df_lines, templates).count()

    n = benchmark(run)
    assert n > 10_000


def test_multiline_extraction(benchmark):
    spec = DatasetSpec(
        "ml", "M(NI)", (fam_json("j", span=6),), (1.0,), 0.0, 500_000, 11
    )
    text, _ = render(spec)
    templates = infer_structures(text).templates
    result = benchmark(lambda: extract_all(text, templates))
    assert len(result.records) > 1000
