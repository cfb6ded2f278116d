"""Index substrate: BM25/LM-Dirichlet, LSH Ensemble, ANN top-k."""
