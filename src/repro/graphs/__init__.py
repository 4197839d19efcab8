"""Graph substrate: generators, partitioning, CSR blocks, dataset registry."""
