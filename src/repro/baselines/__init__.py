"""Every algorithm the paper evaluates against: Power Method, MC,
Linearization, ParSim and PRSim-lite."""
