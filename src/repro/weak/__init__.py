"""Weak supervision: labeling functions, EM label model, gold tuning."""
