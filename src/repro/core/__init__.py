"""The paper's contribution: (k, δ)-truss queries, indexes, construction,
and dynamic maintenance."""
