"""MapReduce cluster simulator for the machine-scaling axes (Figs 1, 7)."""
