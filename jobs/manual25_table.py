"""Reproduce T3 (paper Table 5 + §5.2.1): characteristics of the 25
manually-collected-style datasets and DATAMARAN's per-dataset success
(the paper reports 25/25).

Usage: spark-submit jobs/manual25_table.py [--driver] [--out FILE]
"""
import sys

from _common import emit, get_spark

from repro.eval.harness import run_corpus, run_corpus_spark, to_markdown_table
from repro.loggen import manual25


def main(argv):
    out = argv[argv.index("--out") + 1] if "--out" in argv else None
    specs = manual25()
    if "--driver" in argv:
        df = run_corpus(specs, algos=("dm_exhaustive",))
    else:
        spark = get_spark("manual25")
        df = run_corpus_spark(spark, specs, algos=("dm_exhaustive",))
    df["success"] = df["dm_exhaustive"]
    cols = ["name", "label", "bytes", "n_types", "max_span", "success", "dm_exhaustive_secs"]
    emit(
        "T3: manual-25 corpus characteristics + extraction success (paper Table 5)",
        to_markdown_table(df[cols]),
        out,
    )
    emit(
        "T3 summary",
        f"successful extractions: **{int(df['success'].sum())} / {len(df)}** "
        f"(paper: 25/25)",
        out,
    )
    df.to_csv("manual25_results.csv", index=False)


if __name__ == "__main__":
    main(sys.argv[1:])
