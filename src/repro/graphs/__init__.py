"""Graph substrate: planted-compatibility synthetic generator and edge
DataFrame utilities (built from scratch for this reproduction — the paper's
synthetic stochastic-block-model variant of Section 5)."""
