"""Fleet-mode harness test: the Spark corpus runner must agree with the
driver runner on a small corpus slice."""
import pytest

from repro.eval.harness import accuracy_table, run_corpus, run_corpus_spark
from repro.loggen import github100


@pytest.fixture(scope="module")
def small_specs():
    specs = github100(target_bytes=2500)
    picked = []
    for label in ("S(NI)", "M(NI)", "NS"):
        picked.append(next(s for s in specs if s.label == label))
    return picked


class TestFleetHarness:
    def test_spark_matches_driver(self, spark, small_specs):
        algos = ("dm_greedy", "recordbreaker")
        driver = run_corpus(small_specs, algos=algos).set_index("name")
        fleet = run_corpus_spark(spark, small_specs, algos=algos).set_index("name")
        assert set(driver.index) == set(fleet.index)
        for name in driver.index:
            for a in algos:
                assert bool(driver.loc[name, a]) == bool(fleet.loc[name, a]), (
                    name,
                    a,
                    driver.loc[name, f"{a}_reason"],
                    fleet.loc[name, f"{a}_reason"],
                )

    def test_accuracy_table_structure(self, spark, small_specs):
        df = run_corpus(small_specs, algos=("dm_greedy",))
        t = accuracy_table(df, algos=("dm_greedy",))
        assert "ALL" in set(t["label"])
        assert t["n"].iloc[-1] == 2  # NS excluded
