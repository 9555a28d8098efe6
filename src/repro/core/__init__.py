"""Core contribution of the paper: VGC reachability, hash bag, BGSS SCC."""
