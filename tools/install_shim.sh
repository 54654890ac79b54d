#!/usr/bin/env bash
# Install the offline wheel shim + pip config so `pip install -e .` works
# in the no-network container (see tools/wheel_shim/wheel/__init__.py).
set -euo pipefail
SITE=$(python -c "import site; print(site.getsitepackages()[0])")
SRC="$(cd "$(dirname "$0")" && pwd)/wheel_shim"

cp -r "$SRC/wheel" "$SITE/"
DISTINFO="$SITE/wheel-0.0.shim.dist-info"
mkdir -p "$DISTINFO"
cat > "$DISTINFO/METADATA" <<'EOF'
Metadata-Version: 2.1
Name: wheel
Version: 0.0.shim
Summary: offline shim (editable installs only)
EOF
cat > "$DISTINFO/entry_points.txt" <<'EOF'
[distutils.commands]
bdist_wheel = wheel.bdist_wheel:bdist_wheel
EOF
printf 'wheel\n' > "$DISTINFO/top_level.txt"
: > "$DISTINFO/RECORD"

# Build isolation would try to download setuptools/wheel — disable globally.
mkdir -p ~/.config/pip
cat > ~/.config/pip/pip.conf <<'EOF'
[global]
no-build-isolation = true
EOF
echo "wheel shim installed into $SITE; pip build isolation disabled"
