"""Joint representation: mini-batches, hard triplets, triplet-loss MLP."""
