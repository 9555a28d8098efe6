"""Connected components via LDD-UF-JTB (paper Sec. 5.1)."""
