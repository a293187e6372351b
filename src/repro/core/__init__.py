"""WarpGate core: column embeddings, SimHash LSH, sampling, system."""
