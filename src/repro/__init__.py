"""Reproduction of "Streaming Democratized: Ease Across the Latency Spectrum
with Delayed View Semantics and Snowflake Dynamic Tables" (SIGMOD 2025).

See DESIGN.md for the module map and EXPERIMENTS.md for the experiment tables.
"""
