"""Modeling: GTN plan embedder + MLP regressor for subQ / QS / LQP̄ targets."""
