"""Graph substrate: generators, basic ops, connected components, triangles."""
