"""Measurement harness: metrics, experiment runner, and the definitions of
every evaluation experiment (paper Section 9)."""
