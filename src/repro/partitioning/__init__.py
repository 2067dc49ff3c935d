"""Partitioning strategies: algorithmic baselines (PAR-C/D/A) and PAR-G."""
