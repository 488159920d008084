"""Paper core: colorful-support reductions, bounds, search, heuristics."""
