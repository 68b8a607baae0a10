"""The TER-iDS operator (paper Section 5) and its five baselines."""
