"""The paper's contribution: DUST — alignment, representation,
diversification, and the end-to-end pipeline (Algorithms 1 and 2)."""
