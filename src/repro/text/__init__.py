"""NLP preprocessing substrate: tokenizer, lexicons, Spark bag-of-words."""
