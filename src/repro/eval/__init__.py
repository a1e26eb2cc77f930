"""Evaluation harness: metrics and per-table experiment drivers."""
