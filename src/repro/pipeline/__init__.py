"""Batch pre-processing pipeline and run-time lookup (Section III)."""
