"""Synthetic log-dataset substrate with ground truth.

The paper evaluates on 25 manually collected datasets (Table 5) and 100
log files crawled from GitHub (Section 5.3); neither corpus ships with
the paper.  This package generates synthetic equivalents whose
*characteristics* mirror the published ones (multi-line records,
interleaved record types, noise, fields that contain special
characters), together with exact ground truth: record boundaries,
record types, and the character spans of every intended extraction
target — which is what the Section 5.1 evaluation criterion needs.
"""
from .fields import FieldSpec  # noqa: F401
from .spec import DatasetSpec, LineSpec, RecordTypeSpec, render  # noqa: F401
from .corpus import github100, manual25, render_table_log  # noqa: F401
