"""Spark execution layer: event streams, direct/rolled-up window
aggregation, sliced evaluation, Structured Streaming, and metering."""
