"""System-performance substrate: resource monitoring (psutil substitute)
and the RedPajama-style per-OP eager baseline pipeline."""
