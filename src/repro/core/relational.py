"""Relational output (Section 3.3, Figure 7).

Each field slot of a structure template is one column.  Top-level slots
live in the root table; every array becomes a child table whose rows
carry a foreign key to the root record (normalized form).  Elements of
nested arrays are flattened into their own child table in element
order, keyed by the root record.  Column names are ``f<slot>``;
child tables are named ``t<type>_a<arrayslot>``.
"""
from __future__ import annotations

import pandas as pd

from .parsing import CompiledTemplate, ParseResult
from .template import FIELD, Array, Template


def _partition_slots(ct: CompiledTemplate):
    """Split field slots into root slots and per-array slots."""
    root: list = []
    per_array: dict = {a: [] for a in ct.array_slots.values()}

    def walk(t: Template, path: tuple, owner):
        for idx, a in enumerate(t):
            p = path + (idx,)
            if a is FIELD:
                owner.append(ct.field_slots[p])
            elif isinstance(a, Array):
                walk(a.body, p, per_array[ct.array_slots[p]])

    walk(ct.template, (), root)
    return root, per_array


def to_tables(ct: CompiledTemplate, parse: ParseResult, prefix: str = "t") -> dict:
    """Extracted records of one template -> {table_name: pandas.DataFrame}."""
    root_slots, array_slots = _partition_slots(ct)
    name = f"{prefix}{ct.type_id}"
    root_rows = []
    child_rows: dict = {a: [] for a in array_slots}
    for rid, rec in enumerate(r for r in parse.records if r.type_id == ct.type_id):
        by_slot: dict = {}
        for slot, value, _, _ in rec.fields:
            by_slot.setdefault(slot, []).append(value)
        row = {"record_id": rid, "start_line": rec.start_line}
        for s in root_slots:
            vals = by_slot.get(s, [])
            row[f"f{s}"] = vals[0] if vals else None
        root_rows.append(row)
        for aslot, slots in array_slots.items():
            if not slots:
                continue
            n = max((len(by_slot.get(s, [])) for s in slots), default=0)
            for i in range(n):
                crow = {"record_id": rid, "idx": i}
                for s in slots:
                    vals = by_slot.get(s, [])
                    crow[f"f{s}"] = vals[i] if i < len(vals) else None
                child_rows[aslot].append(crow)
    root_cols = ["record_id", "start_line"] + [f"f{s}" for s in root_slots]
    tables = {name: pd.DataFrame(root_rows, columns=root_cols)}
    for aslot, rows in child_rows.items():
        slots = array_slots[aslot]
        if not slots:
            continue
        cols = ["record_id", "idx"] + [f"f{s}" for s in slots]
        tables[f"{name}_a{aslot}"] = pd.DataFrame(rows, columns=cols)
    return tables


def result_tables(result) -> dict:
    """All tables for a DatamaranResult (root + child per record type)."""
    out: dict = {}
    for ct in result.templates:
        out.update(to_tables(ct, result.parse))
    return out
