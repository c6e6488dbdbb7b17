"""Max-flow substrate for local connectivity testing (paper §4.1, §4.3)."""
