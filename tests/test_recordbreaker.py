"""Unit tests for the RecordBreaker baseline."""
import pytest

from repro.baseline.recordbreaker import MIN_REPS, RBResult, run_recordbreaker


class TestClustering:
    def test_identical_lines_one_cluster(self):
        rb = run_recordbreaker("a,1\nb,2\nc,3\n")
        assert len(rb.clusters) == 1
        assert rb.line_keys[0] == rb.line_keys[2]

    def test_different_shapes_different_clusters(self):
        rb = run_recordbreaker("a,1\nk=v\n")
        assert len(rb.clusters) == 2

    def test_multiline_record_lines_split(self):
        # a 2-line record becomes two different structures — the Boundary
        # assumption in action
        rb = run_recordbreaker("<h>\nk=v\n<h>\nk=v\n")
        assert len(rb.clusters) == 2
        assert rb.clusters[rb.line_keys[0]] == [0, 2]
        assert rb.clusters[rb.line_keys[1]] == [1, 3]

    def test_variable_word_counts_fragment(self):
        # the fixed lexer treats the space as formatting; 1 vs 2 vs 3
        # words yield different skeletons (< MIN_REPS folds)
        rb = run_recordbreaker("x: a\nx: a b\nx: a b c\n")
        assert len(rb.clusters) == 3

    def test_min_reps_fold_merges_long_lists(self):
        # >= MIN_REPS repetitions fold into an array -> same skeleton
        assert MIN_REPS == 3
        rb = run_recordbreaker("x: a b c\nx: a b c d\nx: a b c d e\n")
        assert len(rb.clusters) == 1

    def test_dirty_field_fragments_type(self):
        # field value with variable special-char shape -> fragmentation
        lines = "u=bob@ex.com\nu=al@a.b.co\n"
        rb = run_recordbreaker(lines)
        assert len(rb.clusters) == 2


class TestCuts:
    def test_cuts_cover_field_boundaries(self):
        rb = run_recordbreaker("ab=cd\n")
        cuts = rb.cuts[0]
        assert {0, 2, 3, 5, 6} <= cuts

    def test_cuts_absolute_offsets(self):
        rb = run_recordbreaker("a=b\nc=d\n")
        assert 4 in rb.cuts[1]  # second line starts at 4
        assert 5 in rb.cuts[1]


class TestTables:
    def test_table_per_cluster(self):
        rb = run_recordbreaker("a,1\nb,2\nk=v\n")
        tables = rb.tables()
        assert len(tables) == 2
        csv_t = tables[rb.line_keys[0]]
        assert csv_t.shape == (2, 2)
        assert list(csv_t["f0"]) == ["a", "b"]

    def test_empty_text(self):
        rb = run_recordbreaker("x\n")
        assert len(rb.clusters) == 1
