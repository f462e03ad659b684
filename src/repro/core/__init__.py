"""Core distances and bounds: LD/NLD (strings), SLD/NSLD (tokenized
strings), the assignment solver, and the paper's pruning lemmas."""
