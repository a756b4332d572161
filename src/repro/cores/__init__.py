"""k-core and (k, Psi)-core decomposition: distributed and driver-exact."""
