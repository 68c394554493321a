"""Corpus harness: run DATAMARAN (exhaustive + greedy) and RecordBreaker
over a dataset collection and compute accuracy per category — the code
behind the Figure 17b / Table 5 reproductions.

Two execution modes: ``run_corpus`` on the driver, and
``run_corpus_spark`` distributing one dataset per task via the fleet
mode in ``core.spark_ext`` (the data-lake setting: structure inference
for many files in parallel).
"""
from __future__ import annotations

import json
import time

import pandas as pd

from ..baseline.recordbreaker import run_recordbreaker
from ..core.extract import Params, run_datamaran
from ..loggen.spec import DatasetSpec, render
from .criteria import check_datamaran, check_recordbreaker

ALGOS = ("dm_exhaustive", "dm_greedy", "recordbreaker")


def evaluate_dataset(spec: DatasetSpec, algos=ALGOS, params: Params = Params()) -> dict:
    """Run the selected algorithms on one rendered dataset."""
    text, truth = render(spec)
    row = {
        "name": spec.name,
        "label": spec.label,
        "bytes": len(text),
        "n_types": len(spec.types),
        "max_span": spec.max_span,
        "dirty": any(t.is_dirty for t in spec.types),
    }
    for algo in algos:
        t0 = time.perf_counter()
        if algo == "recordbreaker":
            v = check_recordbreaker(truth, run_recordbreaker(text))
        else:
            p = Params(
                **{
                    **params.__dict__,
                    "exhaustive": algo == "dm_exhaustive",
                }
            )
            res = run_datamaran(text, p)
            v = check_datamaran(truth, res)
            row[f"{algo}_templates"] = len(res.templates)
        row[algo] = v.success
        row[f"{algo}_reason"] = v.reason
        row[f"{algo}_secs"] = time.perf_counter() - t0
    return row


def run_corpus(specs: list, algos=ALGOS, params: Params = Params()) -> pd.DataFrame:
    return pd.DataFrame([evaluate_dataset(s, algos, params) for s in specs])


def run_corpus_spark(
    spark, specs: list, algos=ALGOS, params: Params = Params()
) -> pd.DataFrame:
    """Fleet mode: one dataset per task, evaluated in parallel."""
    from pyspark.sql import types as st

    schema = st.StructType([st.StructField("row_json", st.StringType())])
    by_name = {s.name: s for s in specs}
    algos = tuple(algos)

    def run_one(pdf: pd.DataFrame) -> pd.DataFrame:
        (name,) = pdf["name"].unique()
        row = evaluate_dataset(by_name[name], algos, params)
        return pd.DataFrame([(json.dumps(row),)], columns=["row_json"])

    names = spark.createDataFrame(pd.DataFrame({"name": list(by_name)}))
    out = (
        names.repartition(len(by_name), "name")
        .groupBy("name")
        .applyInPandas(run_one, schema=schema)
        .collect()
    )
    return pd.DataFrame([json.loads(r["row_json"]) for r in out])


def accuracy_table(df: pd.DataFrame, algos=ALGOS) -> pd.DataFrame:
    """Per-category accuracy (Figure 17b as a table).  NS datasets are
    excluded from accuracy, as in the paper (nothing to extract)."""
    structured = df[df["label"] != "NS"]
    rows = []
    for label, grp in structured.groupby("label"):
        row = {"label": label, "n": len(grp)}
        for a in algos:
            row[a] = grp[a].mean() * 100.0
        rows.append(row)
    total = {"label": "ALL", "n": len(structured)}
    for a in algos:
        total[a] = structured[a].mean() * 100.0
    rows.append(total)
    order = {"S(NI)": 0, "S(I)": 1, "M(NI)": 2, "M(I)": 3, "ALL": 9}
    return (
        pd.DataFrame(rows)
        .sort_values("label", key=lambda s: s.map(order))
        .reset_index(drop=True)
    )


def to_markdown_table(df: pd.DataFrame, floatfmt: str = "{:.1f}") -> str:
    def fmt(v):
        if isinstance(v, float):
            return floatfmt.format(v)
        return str(v)

    cols = list(df.columns)
    lines = ["| " + " | ".join(cols) + " |", "|" + "---|" * len(cols)]
    for _, r in df.iterrows():
        lines.append("| " + " | ".join(fmt(r[c]) for c in cols) + " |")
    return "\n".join(lines)
