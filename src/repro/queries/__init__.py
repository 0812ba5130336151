"""Spatio-temporal queries over summaries: STRQ, TPQ, exact filtering."""
