"""The paper's contribution: iterated h-index nucleus decomposition."""
