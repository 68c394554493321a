"""Corpus builders mirroring the paper's two dataset collections.

``manual25`` mirrors Table 5 row by row (relative size, # record types,
max record span).  ``github100`` mirrors the Section 5.3 GitHub corpus
with the category counts reconstructed from the paper's percentages:
44 S(NI), 14 S(I), 13 M(NI), 18 M(I), 11 NS (see DESIGN.md for the
derivation).  Difficulty features follow the paper's observations:
a fraction of datasets have fields containing special characters
(Tokenization-assumption violations), two have records longer than
L=10 lines (the paper's stated DATAMARAN failure cause #1), and two
interleaved datasets have near-identical record types (failure cause
#2, greedy merging).
"""
from __future__ import annotations

import random

from .fields import FieldSpec
from .spec import DatasetSpec, LineSpec, ListSpec, RecordTypeSpec

F = FieldSpec


def _t(name, *lines) -> RecordTypeSpec:
    return RecordTypeSpec(name, tuple(LineSpec(tuple(els)) for els in lines))


# ---------------------------------------------------------------- families
def fam_csv(name: str, n_cols: int = 4, dirty: bool = False, sep: str = ",") -> RecordTypeSpec:
    kinds = ["int", "word", "float", "enum", "hex", "host"]
    els: list = []
    for i in range(n_cols):
        if i:
            els.append(sep)
        kind = "text" if dirty and i == n_cols - 1 else kinds[i % len(kinds)]
        els.append(F(kind, target=f"{name}.c{i}"))
    return _t(name, els)


def fam_access(name: str, dirty: bool = False) -> RecordTypeSpec:
    """Web-server access-log style: ip - - [date time] "req" code size."""
    els = [
        F("ip", target=f"{name}.ip"), " - - [", F("date", target=f"{name}.date"),
        " ", F("time", target=f"{name}.time"), '] "',
        F("word", target=f"{name}.verb"), " ",
        F("path" if dirty else "word", target=f"{name}.req"), '" ',
        F("int", lo=200, hi=599, target=f"{name}.code"), " ",
        F("int", lo=0, hi=100000, target=f"{name}.size"),
    ]
    return _t(name, els)


def fam_bracket(name: str, dirty: bool = False) -> RecordTypeSpec:
    els = [
        "[", F("time", target=f"{name}.time"), "] [",
        F("enum", target=f"{name}.level"), "] ",
        F("host", target=f"{name}.host"), ": ",
    ]
    if dirty:
        els.append(ListSpec(F("text", n_words=1), " ", 2, 6, target=f"{name}.msg"))
    else:
        els.append(F("word", target=f"{name}.msg"))
    return _t(name, els)


def fam_syslog(name: str, dirty: bool = True) -> RecordTypeSpec:
    els = [
        F("date", target=f"{name}.date"), " ",
        F("time", target=f"{name}.time"), " ",
        F("host", target=f"{name}.host"), " ",
        F("word", target=f"{name}.prog"), ": ",
    ]
    if dirty:
        els.append(ListSpec(F("text", n_words=1), " ", 1, 5, target=f"{name}.msg"))
    else:
        els.append(F("word", target=f"{name}.msg"))
    return _t(name, els)


def fam_kv(name: str, span: int = 1, dirty: bool = False, sep: str = ";") -> RecordTypeSpec:
    # key names carry the type name: distinct record types use distinct
    # key vocabularies (otherwise a 1-line kv type would be textually
    # identical to the first line of a k-line kv type and no extractor —
    # or human — could tell the record types apart)
    lines = []
    for j in range(span):
        kind = "text" if dirty and j == span - 1 else ("int" if j % 2 else "word")
        lines.append(
            [
                f"{name}k{j}", "=", F(kind, target=f"{name}.v{j}"), sep,
                f"{name}m{j}", "=", F("int", target=f"{name}.w{j}"), sep,
            ]
        )
    return _t(name, *lines)


def fam_json(name: str, span: int = 5) -> RecordTypeSpec:
    """Multi-line JSON-ish record (the Thailand-district shape, Fig 1)."""
    assert span >= 3
    lines: list = [["{"]]
    for j in range(span - 2):
        kind = ("word", "int", "float", "host")[j % 4]
        lines.append(
            ['  "', f"{name}key{j}", '": "', F(kind, target=f"{name}.k{j}"), '",']
        )
    lines.append(["},"])
    return _t(name, *lines)


def fam_fastq(name: str) -> RecordTypeSpec:
    return _t(
        name,
        ["@", F("word", target=f"{name}.id"), ".", F("int", target=f"{name}.run")],
        [F("hex", target=f"{name}.seq")],
        ["+"],
        [F("hex", target=f"{name}.qual")],
    )


def fam_table(name: str, n_cols: int = 4, dirty: bool = False) -> RecordTypeSpec:
    els: list = []
    for i in range(n_cols):
        if i:
            els.append(" | ")
        kind = "path" if dirty and i == n_cols - 1 else ("word", "int", "float")[i % 3]
        els.append(F(kind, target=f"{name}.c{i}"))
    return _t(name, els)


def fam_xml(name: str, n_attrs: int = 4) -> RecordTypeSpec:
    els: list = ["<row"]
    for i in range(n_attrs):
        els += [f' a{i}="', F(("int", "word", "hex")[i % 3], target=f"{name}.a{i}"), '"']
    els.append(" />")
    return _t(name, els)


def fam_longkv(name: str, span: int) -> RecordTypeSpec:
    """A record longer than L lines — the paper's failure cause #1."""
    return fam_kv(name, span=span)


def fam_colonwords(name: str, n_words: int) -> RecordTypeSpec:
    """``F: w w w`` — n space-separated words after a colon-tagged head.

    Two of these with different word counts share the minimal template
    ``F: (F )*F\\n``: the paper's Section 9.4 greedy-merge failure case
    for interleaved datasets (both types collapse into one template, so
    record types cannot be correctly identified)."""
    els: list = [F("word", target=f"{name}.tag"), ": "]
    for i in range(n_words):
        if i:
            els.append(" ")
        els.append(F("word", target=f"{name}.w{i}"))
    return _t(name, els)


# ------------------------------------------------------- manual 25 corpus
#: (dataset name, paper size MB, families builder, noise)
def manual25(scale: float = 0.002, min_bytes: int = 12_000) -> list:
    """25 specs mirroring Table 5 (name, relative size, # types, span)."""

    def size(mb: float) -> int:
        return max(min_bytes, int(mb * 1e6 * scale * 10))

    rows = [
        ("transaction_records", 0.07, [fam_csv("tr", 5)], 0.0),
        ("comma_sep_records", 0.02, [fam_csv("cs", 3)], 0.0),
        ("web_server_log", 0.29, [fam_access("ws")], 0.0),
        ("mac_asl_log", 0.28, [fam_bracket("asl")], 0.05),
        ("mac_boot_log", 0.02, [fam_syslog("boot", dirty=False)], 0.05),
        ("crash_log", 0.05, [fam_kv("cr", span=3)], 0.1),
        ("crash_log_mod", 0.05, [fam_kv("crm", span=3, sep=",")], 0.1),
        ("ls_l_output", 0.01, [fam_table("ls", 5)], 0.0),
        ("netstat_output", 0.01, [fam_table("ns1", 4), fam_kv("ns2")], 0.0),
        ("printer_logs", 0.02, [fam_syslog("pr", dirty=False)], 0.05),
        ("personal_income", 0.01, [fam_csv("pi", 4)], 0.0),
        ("us_railroad", 0.01, [fam_csv("rr", 4, sep="|")], 0.0),
        ("application_log", 0.06, [fam_bracket("app")], 0.05),
        ("loginwindow_log", 0.05, [fam_syslog("lw", dirty=False)], 0.0),
        ("pkg_install_log", 0.02, [fam_kv("pkg")], 0.0),
        ("thailand_district", 0.19, [fam_json("th", span=8)], 0.0),
        ("stackexchange_xml", 20.0, [fam_xml("se", 5)], 0.0),
        ("vcf_genetic", 167.4, [fam_csv("vcf", 8, sep="\t")], 0.02),
        ("fastq_genetic", 29.9, [fam_fastq("fq")], 0.0),
        ("blog_xml", 0.06, [fam_json("blog", span=10)], 0.0),
        ("log_file_1", 0.03, [fam_json("l1a", span=9), fam_bracket("l1b")], 0.05),
        ("log_file_2", 0.01, [fam_kv("l2", span=3)], 0.1),
        ("log_file_3", 0.19, [fam_bracket("l3a"), fam_kv("l3b")], 0.05),
        ("log_file_4", 0.07, [fam_json("l4a", span=10), fam_table("l4b")], 0.0),
        ("log_file_5", 0.09, [fam_kv("l5", span=4)], 0.1),
    ]
    specs = []
    for i, (name, mb, fams, noise) in enumerate(rows):
        types = tuple(fams)
        w = tuple([3.0] + [1.0] * (len(types) - 1))
        label = ("M" if any(t.span > 1 for t in types) else "S") + (
            "(I)" if len(types) > 1 else "(NI)"
        )
        specs.append(
            DatasetSpec(name, label, types, w, noise, size(mb), seed=1000 + i)
        )
    return specs


def _literals(t: RecordTypeSpec) -> tuple:
    """Formatting fingerprint: the literal strings of every line."""
    return tuple(
        tuple(el for el in ln.elements if isinstance(el, str)) for ln in t.lines
    )


# ------------------------------------------------------ github 100 corpus
def github100(target_bytes: int = 24_000) -> list:
    """100 specs with the category mix of Section 5.3 (see module doc)."""
    specs: list = []
    rng = random.Random(42)

    def clean_single(name):
        return rng.choice(
            [
                lambda: fam_csv(name, rng.randint(3, 6)),
                lambda: fam_access(name),
                lambda: fam_bracket(name),
                lambda: fam_kv(name),
                lambda: fam_xml(name, rng.randint(3, 5)),
                lambda: fam_table(name, rng.randint(3, 5)),
                lambda: fam_syslog(name, dirty=False),
            ]
        )()

    def dirty_single(name):
        return rng.choice(
            [
                lambda: fam_syslog(name, dirty=True),
                lambda: fam_bracket(name, dirty=True),
                lambda: fam_csv(name, rng.randint(3, 5), dirty=True),
                lambda: fam_table(name, rng.randint(3, 5), dirty=True),
                lambda: fam_access(name, dirty=True),
            ]
        )()

    def multi(name, span):
        if span >= 3 and rng.random() < 0.5:
            return fam_json(name, span=span)
        if span == 4 and rng.random() < 0.5:
            return fam_fastq(name)
        return fam_kv(name, span=span)

    def partner_single(name):
        """Single-line partner for interleaved multi-line datasets.

        Drawn from families whose delimiters differ from fam_kv's: when
        both interleaved types are kv-shaped, the generic one-line
        template subsumes every line of both and no extractor can
        recover the type split — the paper's §9.4 failure case, which
        its corpus (visually distinct record types per file) mostly
        avoids."""
        return rng.choice(
            [
                lambda: fam_csv(name, rng.randint(3, 6)),
                lambda: fam_access(name),
                lambda: fam_bracket(name),
                lambda: fam_xml(name, rng.randint(3, 5)),
                lambda: fam_table(name, rng.randint(3, 5)),
                lambda: fam_syslog(name, dirty=False),
            ]
        )()

    idx = 0

    def add(label, types, noise, seed_extra=0):
        nonlocal idx
        w = tuple([2.0] + [1.0] * (len(types) - 1))
        specs.append(
            DatasetSpec(
                f"gh{idx:03d}_{label.replace('(', '').replace(')', '')}",
                label,
                tuple(types),
                w,
                noise,
                target_bytes,
                seed=idx * 7 + seed_extra,
            )
        )
        idx += 1

    # 44 S(NI): 19 dirty (Tokenization violations), 25 clean
    for i in range(44):
        dirty = i < 19
        t = dirty_single(f"a{i}") if dirty else clean_single(f"a{i}")
        add("S(NI)", [t], 0.08 if i % 3 == 0 else 0.0)
    # 14 S(I): 12 with a dirty member, 2 near-identical pairs (greedy-merge
    # hazard, the paper's failure cause #2), 1 fully clean
    for i in range(14):
        if i < 2:  # merge hazard: both types reduce to F: (F )*F\n (§9.4)
            types = [fam_colonwords(f"b{i}x", 3), fam_colonwords(f"b{i}y", 5)]
        elif i < 13:
            x = dirty_single(f"b{i}x")
            y = clean_single(f"b{i}y")
            # two types whose formatting literals coincide (e.g. a dirty
            # and a clean bracket type) are indistinguishable in
            # principle — redraw, as real log files' record types are
            # visually distinct
            for _ in range(5):
                if _literals(y) != _literals(x):
                    break
                y = clean_single(f"b{i}y")
            types = [x, y]
        else:
            types = [fam_csv(f"b{i}x", 4), fam_bracket(f"b{i}y")]
        add("S(I)", types, 0.05 if i % 2 else 0.0)
    # 13 M(NI): one record > L lines (failure cause #1)
    for i in range(13):
        span = 12 if i == 0 else rng.randint(2, 8)
        add("M(NI)", [multi(f"c{i}", span)], 0.06 if i % 3 == 0 else 0.0)
    # 18 M(I): one with a record > L lines
    for i in range(18):
        span = 12 if i == 0 else rng.randint(2, 6)
        types = [multi(f"d{i}x", span), partner_single(f"d{i}y")]
        add("M(I)", types, 0.05 if i % 3 == 0 else 0.0)
    # 11 NS: pure prose, nothing to extract
    for i in range(11):
        add("NS", [], 1.0)
    return specs


# ------------------------------------------------- TPC-H-lite bridge
def render_table_log(pdf, name: str = "orders") -> str:
    """Render a pandas table as a multi-line log (one record per row).

    Used to bridge the provided ``synth_data`` TPC-H-lite generators into
    log form so extraction output can be checked against the original
    table with the DuckDB oracle."""
    cols = list(pdf.columns)
    lines = []
    for row in pdf.itertuples(index=False):
        vals = [str(v) for v in row]
        lines.append(f"== {name} {vals[0]}\n")
        for c, v in zip(cols[1:], vals[1:]):
            lines.append(f"  {c}: {v}\n")
    return "".join(lines)
