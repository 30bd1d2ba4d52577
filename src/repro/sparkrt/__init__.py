"""Spark runtimes: batch (applyInPandas per group partition) and
Structured Streaming (applyInPandasWithState, one pane per micro-batch)."""
