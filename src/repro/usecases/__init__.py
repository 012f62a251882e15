"""The paper's three use-cases (§IV) plus the parallel data-dump study
(§V-F), each with the baselines the paper compares against (trial-and-error,
static offline worst-case, uniform per-partition error bound)."""
