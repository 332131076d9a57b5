"""Parallel clique listing/counting subroutines (paper §4.1)."""
