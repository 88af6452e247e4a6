"""Graph substrate: edge canonicalization, generators, clique enumeration."""
