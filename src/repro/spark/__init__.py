"""Spark-facing layers: Catalyst distance expressions, distributed extent
estimation, the composable-coreset batch runner, and the Structured Streaming
FDM job (DESIGN.md §3)."""
