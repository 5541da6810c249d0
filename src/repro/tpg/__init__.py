"""Temporal property graph substrate: model, interval algebra, datasets."""
