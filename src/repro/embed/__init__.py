"""Word-embedding substrate: synthetic fastText + Spark mean pooling."""
