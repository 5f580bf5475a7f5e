"""Structured Streaming driver: micro-batches as DBSP timesteps."""
