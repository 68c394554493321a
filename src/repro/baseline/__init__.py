"""Baselines: the RecordBreaker / Fisher-style line-by-line extractor."""
