"""ThunderRW core: step-centric model, SDG, engines, Spark runner."""
