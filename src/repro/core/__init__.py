"""Auto-Validate core: offline index, FMDV solvers, validation rules."""
