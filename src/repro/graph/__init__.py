"""Graph substrate: synthetic generators, Spark graph algebra, coloring."""
