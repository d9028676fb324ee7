"""The paper's primary contribution: partial evaluation + LEC-feature
optimizations for distributed SPARQL BGP evaluation (gStore^D)."""
