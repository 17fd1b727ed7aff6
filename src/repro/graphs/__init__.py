"""Graph substrate: synthetic social graphs, propagation models, transforms."""
