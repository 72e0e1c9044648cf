"""Core fact-selection algorithms from the paper (Algorithms 1-4)."""
