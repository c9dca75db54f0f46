"""Storage substrate: compression codecs and the simulated tiered cloud store."""
