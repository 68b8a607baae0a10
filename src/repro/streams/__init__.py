"""Incomplete data stream substrate: dataset generators and the count-based
sliding-window micro-batch driver (paper Definitions 1-2)."""
