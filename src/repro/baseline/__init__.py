"""Run-time baselines the paper compares against (Section VIII-E)."""
