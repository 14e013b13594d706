"""Graph substrate: CSR storage, synthetic dataset generators, stats."""
