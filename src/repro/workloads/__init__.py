"""Synthetic window-set generators of §5.2 (Algorithms 5 and 6)."""
