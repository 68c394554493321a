"""Evaluation substrate: the Section 5.1/9.3 success criterion, the
corpus harness, assumption statistics, timing and sensitivity sweeps."""
