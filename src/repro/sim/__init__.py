"""Simulated external systems (the LLM baseline)."""
