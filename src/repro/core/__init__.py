"""Core of the reproduction: NRAB algebra, NIPs, and the 4-step heuristic
explanation algorithm (schema backtracing → schema alternatives → data
tracing → MSR approximation) of §5."""
