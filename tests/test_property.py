"""Property-based tests (hypothesis): template inversion invariants.

The core invariant behind the generation step: for any structure
template ST and any instantiated record R generated from it with clean
field values, extracting the record template from R with ST's charset
and reducing it yields a template whose regex accepts R again
(Assumption 2 at work).
"""
import string

from hypothesis import given, settings, strategies as st

from repro.core.parsing import CompiledTemplate, parse_text
from repro.core.template import (
    canonical_rotation,
    deserialize,
    extract_record_template,
    reduce_template,
    serialize,
    template_charset,
    to_regex,
)

_value = st.text(alphabet=string.ascii_lowercase + string.digits, min_size=1, max_size=6)
_sep = st.sampled_from(list(",;:|=/ "))


@st.composite
def records(draw):
    """A (record, charset) pair: fields joined by a delimiter, one line."""
    sep = draw(_sep)
    n = draw(st.integers(1, 6))
    vals = [draw(_value) for _ in range(n)]
    return sep.join(vals) + "\n", frozenset({sep})


class TestInversion:
    @given(records())
    @settings(max_examples=150, deadline=None)
    def test_extracted_template_reaccepts_record(self, rc):
        record, charset = rc
        t = reduce_template(extract_record_template(record, charset))
        m = to_regex(t).match(record)
        assert m and m.end() == len(record)

    @given(records())
    @settings(max_examples=100, deadline=None)
    def test_serialize_roundtrip(self, rc):
        record, charset = rc
        t = reduce_template(extract_record_template(record, charset))
        assert deserialize(serialize(t)) == t

    @given(records())
    @settings(max_examples=100, deadline=None)
    def test_parse_recovers_field_values(self, rc):
        record, charset = rc
        t = reduce_template(extract_record_template(record, charset))
        ct = CompiledTemplate(t)
        parse = parse_text(record, [ct])
        assert len(parse.records) == 1
        values = [f[1] for f in parse.records[0].fields]
        # concatenating values with the template literals rebuilds the line
        sep = next(iter(charset))
        assert sep.join(values) + "\n" == record or len(values) == 1

    @given(st.lists(records(), min_size=2, max_size=4))
    @settings(max_examples=50, deadline=None)
    def test_multirecord_charset(self, rcs):
        # charset of a reduced template never exceeds the extraction charset
        for record, charset in rcs:
            t = reduce_template(extract_record_template(record, charset))
            assert template_charset(t) <= charset | {"\n"}

    @given(records(), records())
    @settings(max_examples=60, deadline=None)
    def test_canonical_rotation_idempotent(self, a, b):
        t = reduce_template(
            extract_record_template(a[0], a[1])
            + extract_record_template(b[0], b[1])
        )
        c1 = canonical_rotation(t)
        assert canonical_rotation(c1) == c1
