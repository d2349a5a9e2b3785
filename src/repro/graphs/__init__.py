"""Graph substrate: canonical edge lists, enumeration, cores, components."""
