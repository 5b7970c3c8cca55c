"""Experiment harnesses — one module per reproduced table (DESIGN §5)."""
