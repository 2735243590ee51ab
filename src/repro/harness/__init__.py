"""Experiment harness: result comparison, timing, table printers."""
