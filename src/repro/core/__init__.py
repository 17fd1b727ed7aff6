"""Core estimation machinery: sampling, dominator trees, spread, Algorithm 2."""
