"""GridTuner core: grids, error analysis (paper §II-III), OGSS search (§IV)."""
