"""Measurement harness: uniform runners per (engine, scenario) and the
builders that print each paper table."""
