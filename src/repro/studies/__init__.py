"""Simulated user studies and deployment analysis (Sections VIII-C/D)."""
