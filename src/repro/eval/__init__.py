"""Evaluation harness and table builders for the reproduction."""
