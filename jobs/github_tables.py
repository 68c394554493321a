"""Reproduce T4 (Table 4 / Fig 17a: corpus label distribution) and
T5 (Fig 17b: accuracy by category, DATAMARAN exhaustive/greedy vs
RecordBreaker) on the synthetic GitHub-100 corpus.

Usage: spark-submit jobs/github_tables.py [--driver] [--out FILE]
The default uses Spark fleet mode (one dataset per task); --driver runs
everything single-threaded on the driver.
"""
import sys

from _common import emit, get_spark

from repro.eval.harness import accuracy_table, run_corpus, run_corpus_spark, to_markdown_table
from repro.loggen import github100


def main(argv):
    out = None
    if "--out" in argv:
        out = argv[argv.index("--out") + 1]
    specs = github100()
    import collections

    dist = collections.Counter(s.label for s in specs)
    import pandas as pd

    emit(
        "T4: GitHub corpus label distribution (paper Fig 17a)",
        to_markdown_table(
            pd.DataFrame(
                [{"label": k, "count": v} for k, v in sorted(dist.items())]
            )
        ),
        out,
    )
    if "--driver" in argv:
        df = run_corpus(specs)
    else:
        spark = get_spark("github-tables")
        df = run_corpus_spark(spark, specs)
    df.to_csv("github100_results.csv", index=False)
    emit(
        "T5: extraction accuracy by category (paper Fig 17b)",
        to_markdown_table(accuracy_table(df)),
        out,
    )


if __name__ == "__main__":
    main(sys.argv[1:])
