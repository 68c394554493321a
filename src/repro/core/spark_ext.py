"""Distributed DATAMARAN dataflow on Spark DataFrames.

Two deployment shapes, both built on the DataFrame API (Catalyst) with
pandas-UDF boundaries for the string-level work:

* **Single large file** (the paper's >100 MB case, Figure 14a): lines
  are chunked with an L-line overlap; the *generation* step runs per
  chunk inside ``applyInPandas`` and its per-chunk hash tables are
  merged with ``groupBy(key).agg(sum(...))`` — a textbook map-reduce.
  Pruning + evaluation run on a driver-side sample (they are
  sample-bounded by design, Section 4.4.1); the final *extraction* —
  the dominant cost for large datasets — is distributed the same way,
  each chunk emitting structured rows that are reassembled into one
  DataFrame per record type.

* **Fleet of small files** (the data-lake setting, Section 5.3): one
  row per dataset, ``applyInPandas`` per dataset runs the whole
  single-machine pipeline — the 100-dataset GitHub harness runs this
  way on 16 cores.

A record may straddle a chunk boundary; the overlap equals L (the
maximum record span), so the chunk that *owns* the record's start line
always sees the whole record.  Records are deduplicated by start line,
keeping each chunk's owned range only, which reproduces the sequential
greedy parse except for adversarial interleavings wider than L (tested
equal to the driver implementation on the corpus).
"""
from __future__ import annotations

import json

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as sf
from pyspark.sql import types as st

from .extract import DatamaranResult, Params, infer_structures
from .generation import Candidate, _WindowIndex, _accumulate_charset, present_specials
from .parsing import CompiledTemplate, line_starts_of, parse_text
from .template import deserialize, serialize


def read_lines(spark: SparkSession, path: str) -> DataFrame:
    """A text file as (line_no, line) rows, order preserved."""
    from pyspark.sql.window import Window

    df = spark.read.text(path).withColumn("mid", sf.monotonically_increasing_id())
    w = Window.orderBy("mid")
    return df.select(
        (sf.row_number().over(w) - 1).alias("line_no"), sf.col("value").alias("line")
    )


def _chunked(df_lines: DataFrame, chunk_lines: int, overlap: int) -> DataFrame:
    """Assign each line to its owner chunk and (duplicated) to the
    previous chunk's tail context so no record straddles unseen."""
    owner = df_lines.withColumn(
        "chunk", (sf.col("line_no") / chunk_lines).cast("long")
    )
    dup = (
        df_lines.withColumn("chunk", (sf.col("line_no") / chunk_lines).cast("long") - 1)
        .where((sf.col("line_no") % chunk_lines) < overlap)
        .where(sf.col("chunk") >= 0)
    )
    return owner.unionByName(dup)


_GEN_SCHEMA = st.StructType(
    [
        st.StructField("key", st.StringType()),
        st.StructField("cov", st.LongType()),
        st.StructField("field_cov", st.LongType()),
        st.StructField("count", st.LongType()),
        st.StructField("first_line", st.LongType()),
    ]
)


def generate_candidates_spark(
    spark: SparkSession,
    df_lines: DataFrame,
    params: Params = Params(),
    chunk_lines: int = 2000,
) -> list:
    """Distributed generation step: per-chunk candidate tables merged by
    a Catalyst groupBy/sum; returns Candidates above the alpha threshold."""
    total_chars = df_lines.select(
        sf.sum(sf.length("line") + sf.lit(1))
    ).collect()[0][0]
    charsets_bc = None  # charsets are derived per chunk; keys merge by max

    max_span, max_charset = params.max_span, params.max_charset
    exhaustive = params.exhaustive

    def gen(pdf: pd.DataFrame) -> pd.DataFrame:
        import itertools

        pdf = pdf.sort_values("line_no")
        text = "\n".join(pdf["line"].astype(str)) + "\n"
        idx = _WindowIndex(text)
        table: dict = {}
        cache: dict = {}
        specials = present_specials(text, max_charset)
        if exhaustive:
            for r in range(len(specials) + 1):
                for combo in itertools.combinations(specials, r):
                    _accumulate_charset(idx, frozenset(combo), max_span, table, cache)
        else:
            from .generation import _greedy_charsets

            _greedy_charsets(idx, specials, params.alpha, max_span, table, cache)
        base = int(pdf["line_no"].min())
        return pd.DataFrame(
            [
                (c.key, c.cov, c.field_cov, c.count, base + c.first_line)
                for c in table.values()
            ],
            columns=["key", "cov", "field_cov", "count", "first_line"],
        )

    chunked = _chunked(df_lines, chunk_lines, overlap=0)
    merged = (
        chunked.groupBy("chunk")
        .applyInPandas(gen, schema=_GEN_SCHEMA)
        .groupBy("key")
        .agg(
            sf.sum("cov").alias("cov"),
            sf.sum("field_cov").alias("field_cov"),
            sf.sum("count").alias("count"),
            sf.min("first_line").alias("first_line"),
        )
    )
    floor = params.alpha / 100.0 * total_chars
    rows = merged.where(sf.col("cov") >= sf.lit(floor)).collect()
    from .template import has_field

    out = [
        Candidate(r["key"], r["cov"], r["field_cov"], r["count"], r["first_line"])
        for r in rows
        if r["key"].endswith("\n") and has_field(deserialize(r["key"]))
    ]
    out.sort(key=lambda c: (-c.assimilation, c.key))
    return out


_EXT_SCHEMA = st.StructType(
    [
        st.StructField("type_id", st.IntegerType()),
        st.StructField("start_line", st.LongType()),
        st.StructField("end_line", st.LongType()),
        st.StructField("fields_json", st.StringType()),
    ]
)


def extract_spark(
    spark: SparkSession,
    df_lines: DataFrame,
    templates: list,
    params: Params = Params(),
    chunk_lines: int = 5000,
) -> DataFrame:
    """Distributed final extraction: each chunk parses its lines (plus an
    L-line lookback context) and emits one row per record.

    Returns a DataFrame (type_id, start_line, end_line, fields_json)
    where fields_json maps slot -> list of values.  ``tables_from_rows``
    pivots it into one relational DataFrame per record type."""
    keys = [serialize(ct.template) for ct in templates]
    overlap = params.max_span

    def ext(pdf: pd.DataFrame) -> pd.DataFrame:
        pdf = pdf.sort_values("line_no").drop_duplicates("line_no")
        cts = [CompiledTemplate(deserialize(k), i) for i, k in enumerate(keys)]
        lines = pdf["line_no"].to_numpy()
        text = "\n".join(pdf["line"].astype(str)) + "\n"
        base = int(lines.min())
        chunk = int(pdf["chunk"].iloc[0])
        own_start = chunk * chunk_lines
        own_end = own_start + chunk_lines
        # greedy parse starts at the lookback context so the scan is
        # already re-synchronized when it enters the owned range
        parse = parse_text(text, cts)
        rows = []
        for rec in parse.records:
            s = base + rec.start_line
            if not (own_start <= s < own_end):
                continue  # owned by a neighbouring chunk
            by_slot: dict = {}
            for slot, value, _, _ in rec.fields:
                by_slot.setdefault(slot, []).append(value)
            rows.append(
                (
                    rec.type_id,
                    s,
                    base + rec.end_line,
                    json.dumps({str(k): v for k, v in by_slot.items()}),
                )
            )
        return pd.DataFrame(
            rows, columns=["type_id", "start_line", "end_line", "fields_json"]
        )

    c = sf.col("line_no")
    owner = df_lines.withColumn("chunk", (c / chunk_lines).cast("long"))
    # lookback: the last L lines of the previous chunk, for resync
    lookback = df_lines.withColumn(
        "chunk", (c / chunk_lines).cast("long") + 1
    ).where((c % chunk_lines) >= chunk_lines - overlap)
    # lookahead: the first L lines of the next chunk, so a record starting
    # near the boundary can complete
    lookahead = (
        df_lines.withColumn("chunk", (c / chunk_lines).cast("long") - 1)
        .where((c % chunk_lines) < overlap)
        .where(sf.col("chunk") >= 0)
    )
    max_chunk = owner.agg(sf.max("chunk")).collect()[0][0]
    chunked = owner.unionByName(
        lookback.where(sf.col("chunk") <= sf.lit(max_chunk))
    ).unionByName(lookahead)
    return (
        chunked.groupBy("chunk")
        .applyInPandas(ext, schema=_EXT_SCHEMA)
        .dropDuplicates(["start_line"])
        .orderBy("start_line")
    )


def tables_from_rows(rows: DataFrame, templates: list) -> dict:
    """Pivot extraction rows into one Spark DataFrame per record type,
    with column f<slot> per field slot (arrays joined with \\x1f)."""
    out = {}
    for ct in templates:
        slots = sorted(ct.field_slots.values())
        sel = rows.where(sf.col("type_id") == ct.type_id)
        parsed = sel.withColumn(
            "m",
            sf.from_json(
                "fields_json", st.MapType(st.StringType(), st.ArrayType(st.StringType()))
            ),
        )
        cols = [sf.col("start_line")] + [
            sf.array_join(sf.col("m").getItem(str(s)), "\x1f").alias(f"f{s}")
            for s in slots
        ]
        out[f"t{ct.type_id}"] = parsed.select(*cols)
    return out


def run_datamaran_spark(
    spark: SparkSession, path: str, params: Params = Params()
) -> tuple:
    """End-to-end on one (possibly large) file: distributed generation
    is implicit in the driver sampling (Section 9.1); structure inference
    runs on the driver sample; extraction is distributed.

    Returns (DatamaranResult-without-parse, rows DataFrame, tables)."""
    df_lines = read_lines(spark, path).cache()
    head = df_lines.orderBy("line_no").limit(4000).collect()
    sample = "".join(r["line"] + "\n" for r in head)
    result = infer_structures(sample, params)
    rows = extract_spark(spark, df_lines, result.templates, params)
    tables = tables_from_rows(rows, result.templates)
    return result, rows, tables


def run_datamaran_fleet(
    spark: SparkSession, datasets: list, params: Params = Params()
) -> pd.DataFrame:
    """Data-lake fleet mode: run the full pipeline once per dataset, in
    parallel across the cluster.  ``datasets`` is a list of (name, text)
    pairs; returns a pandas frame (name, templates_json, n_records,
    n_noise, seconds)."""
    schema = st.StructType(
        [
            st.StructField("name", st.StringType()),
            st.StructField("templates_json", st.StringType()),
            st.StructField("records_json", st.StringType()),
            st.StructField("n_records", st.LongType()),
            st.StructField("n_noise", st.LongType()),
            st.StructField("seconds", st.DoubleType()),
        ]
    )

    def run_one(pdf: pd.DataFrame) -> pd.DataFrame:
        import time

        from .extract import run_datamaran

        (name,) = pdf["name"].unique()
        text = "".join(pdf.sort_values("part")["text"])
        t0 = time.perf_counter()
        res = run_datamaran(text, params)
        secs = time.perf_counter() - t0
        recs = [
            (r.type_id, r.start_line, r.end_line, sorted(r.cuts or ()))
            for r in res.parse.records
        ]
        return pd.DataFrame(
            [
                (
                    name,
                    json.dumps([serialize(ct.template) for ct in res.templates]),
                    json.dumps(recs),
                    len(res.parse.records),
                    len(res.parse.noise_lines),
                    secs,
                )
            ],
            columns=[c.name for c in schema.fields],
        )

    rows = []
    for name, text in datasets:
        # split long texts into parts to stay under Arrow's cell limits
        for j in range(0, len(text), 1_000_000):
            rows.append((name, j, text[j : j + 1_000_000]))
    pdf = pd.DataFrame(rows, columns=["name", "part", "text"])
    df = spark.createDataFrame(pdf).repartition(64, "name")
    return df.groupBy("name").applyInPandas(run_one, schema=schema).toPandas()
