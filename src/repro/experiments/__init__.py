"""Measurement harnesses for the paper's evaluation section (Table 1)."""
