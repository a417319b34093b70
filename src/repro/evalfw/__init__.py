"""Evaluation harness for §5: the five participating techniques on a
common cost scale, figure runners, and report rendering."""
