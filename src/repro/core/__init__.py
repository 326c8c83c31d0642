"""Auto-Test core: SDC model, candidate generation, statistical assessment,
LP-based selection, and online prediction (paper Sections 4-5)."""
